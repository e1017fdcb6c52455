"""Unit tests for the catalog: dense RIDs, PREDEFINE JOIN materialization,
index registration (paper §3)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.catalog import RID, Catalog, rid_col_name


@pytest.fixture()
def cat(spark):
    c = Catalog(spark, zone_size=4)
    yield c
    c.unpersist()


def _register_pair(cat):
    cat.register("p", pd.DataFrame({"k": [10, 20, 30], "v": ["a", "b", "c"]}))
    cat.register("f", pd.DataFrame({"fk": [20, 10, 20, 99], "w": [1, 2, 3, 4]}))
    return cat


def test_dense_rid_assignment(cat):
    t = cat.register("t", pd.DataFrame({"x": [5, 6, 7]}))
    assert t.pdf[RID].tolist() == [0, 1, 2]


def test_rid_reserved(cat):
    with pytest.raises(ValueError):
        cat.register("t", pd.DataFrame({RID: [1]}))


def test_duplicate_registration_rejected(cat):
    cat.register("t", pd.DataFrame({"x": [1]}))
    with pytest.raises(ValueError):
        cat.register("t", pd.DataFrame({"x": [1]}))


def test_predefine_materializes_rids(cat):
    _register_pair(cat)
    pj = cat.predefine_join("f", ["fk"], "p", ["k"])
    got = cat.table("f").pdf[pj.rid_col].tolist()
    assert got[:3] == [1, 0, 1]
    assert pd.isna(got[3])  # dangling FK -> null pointer


def test_predefine_preserves_row_order(cat):
    _register_pair(cat)
    cat.predefine_join("f", ["fk"], "p", ["k"])
    assert cat.table("f").pdf["w"].tolist() == [1, 2, 3, 4]


def test_predefine_rejects_non_unique_pk(cat):
    cat.register("p", pd.DataFrame({"k": [1, 1]}))
    cat.register("f", pd.DataFrame({"fk": [1]}))
    with pytest.raises(ValueError, match="not unique"):
        cat.predefine_join("f", ["fk"], "p", ["k"])


def test_predefine_twice_rejected(cat):
    _register_pair(cat)
    cat.predefine_join("f", ["fk"], "p", ["k"])
    with pytest.raises(ValueError, match="already predefined"):
        cat.predefine_join("f", ["fk"], "p", ["k"])


def test_multi_column_key(cat):
    cat.register("p", pd.DataFrame({"a": [1, 1, 2], "b": [1, 2, 1]}))
    cat.register("f", pd.DataFrame({"x": [2, 1], "y": [1, 2]}))
    pj = cat.predefine_join("f", ["x", "y"], "p", ["a", "b"])
    assert cat.table("f").pdf[pj.rid_col].tolist() == [2, 1]


def test_self_referential_predefine(cat):
    cat.register("t", pd.DataFrame({"id": [100, 200, 300], "parent": [300, 100, 100]}))
    pj = cat.predefine_join("t", ["parent"], "t", ["id"])
    assert cat.table("t").pdf[pj.rid_col].tolist() == [2, 0, 0]


def test_string_key_predefine(cat):
    cat.register("p", pd.DataFrame({"k": ["x", "y"]}))
    cat.register("f", pd.DataFrame({"fk": ["y", "x", "y"]}))
    pj = cat.predefine_join("f", ["fk"], "p", ["k"])
    assert cat.table("f").pdf[pj.rid_col].tolist() == [1, 0, 1]


def test_rid_col_name_stable():
    assert rid_col_name("person", ("person1id",)) == "_rid_person__person1id"


def test_find_predefined_both_orientations(cat):
    _register_pair(cat)
    cat.predefine_join("f", ["fk"], "p", ["k"])
    pj, side = cat.find_predefined("f", ("fk",), "p", ("k",))
    assert side == "a" and pj.f_table == "f"
    pj, side = cat.find_predefined("p", ("k",), "f", ("fk",))
    assert side == "b" and pj.f_table == "f"
    assert cat.find_predefined("f", ("w",), "p", ("k",)) is None


def test_build_rid_index_requires_predefine(cat):
    _register_pair(cat)
    with pytest.raises(ValueError, match="no predefined join"):
        cat.build_rid_index("f", ["fk"])


def test_build_rid_index(cat):
    _register_pair(cat)
    cat.predefine_join("f", ["fk"], "p", ["k"])
    idx = cat.build_rid_index("f", ["fk"])
    assert idx.lookup(0).tolist() == [1]
    assert sorted(idx.lookup(1).tolist()) == [0, 2]
    assert cat.rid_index("f", ("fk",)) is idx


def test_extended_index_requires_second_predefine(cat):
    _register_pair(cat)
    cat.predefine_join("f", ["fk"], "p", ["k"])
    with pytest.raises(ValueError, match="not a predefined join"):
        cat.build_rid_index("f", ["fk"], extended_cols=["w"])


def test_finalize_creates_cached_dfs(spark, cat):
    _register_pair(cat)
    cat.predefine_join("f", ["fk"], "p", ["k"])
    cat.finalize()
    df = cat.table("f").df
    assert df is not None
    cols = set(df.columns)
    assert RID in cols and rid_col_name("p", ("fk",)) in cols
    assert df.count() == 4


def test_finalize_then_mutation_rejected(cat):
    _register_pair(cat)
    cat.finalize()
    with pytest.raises(RuntimeError):
        cat.register("t2", pd.DataFrame({"x": [1]}))
    with pytest.raises(RuntimeError):
        cat.predefine_join("f", ["fk"], "p", ["k"])


def test_oracle_tables_exclude_rid_columns(cat):
    _register_pair(cat)
    cat.predefine_join("f", ["fk"], "p", ["k"])
    orig = cat.oracle_tables()
    assert list(orig["f"].columns) == ["fk", "w"]


def test_nullable_rid_roundtrips_through_spark(spark, cat):
    _register_pair(cat)
    pj = cat.predefine_join("f", ["fk"], "p", ["k"])
    cat.finalize()
    vals = cat.table("f").df.select(pj.rid_col).toPandas()[pj.rid_col]
    assert vals.isna().sum() == 1
    assert set(vals.dropna().astype(int)) == {0, 1}


def test_predefine_relationship_builds_both_indices(cat):
    cat.register("p", pd.DataFrame({"k": [1, 2]}))
    cat.register("e", pd.DataFrame({"s": [1, 2, 1], "d": [2, 1, 1]}))
    cat.predefine_relationship("e", ["s"], "p", ["k"], ["d"], "p", ["k"])
    fwd, bwd = cat.rid_index("e", ("s",)), cat.rid_index("e", ("d",))
    assert fwd is not None and bwd is not None
    assert fwd.ext_rids is not None and bwd.ext_rids is not None
    assert cat.index_ext_target[("e", ("s",))].fk_cols == ("d",)
