"""Unit tests for driver-side semijoin propagation (SIP mask computation)."""
import numpy as np
import pytest

from repro.core.semijoin_reduce import propagate
from repro.plan.spec import JoinEdge, QuerySpec, TableRef


def _spec():
    return QuerySpec(
        name="prop",
        tables=[TableRef("p1", "person"), TableRef("f", "follows"),
                TableRef("p2", "person")],
        joins=[JoinEdge.of("p1.ID", "f.ID1"), JoinEdge.of("f.ID2", "p2.ID")],
        filters=["p1.name = 'Karim'"],
        select=[("p2.name", "n")],
    )


def test_forward_propagation_via_materialized_column(follows_cat):
    # f-set given: p2-set follows f's RID(ID2) column.
    sets = propagate({"f": np.array([3]), "p2": None, "p1": None}, _spec(),
                     follows_cat)
    assert sets["p2"].tolist() == [2]  # Follows row 3 points at Carmen (RID 2)


def test_reverse_propagation_via_index(follows_cat):
    # p1 = Karim (RID 1) -> f rows with ID1=202 -> {3}.
    sets = propagate({"p1": np.array([1]), "f": None, "p2": None}, _spec(),
                     follows_cat)
    assert sets["f"].tolist() == [3]
    assert sets["p2"].tolist() == [2]


def test_reverse_disabled_blocks_index_steps(follows_cat):
    sets = propagate({"p1": np.array([1]), "f": None, "p2": None}, _spec(),
                     follows_cat, allow_reverse=False)
    assert sets["f"] is None  # F-set from P-set needs the index (reverse)
    assert sets["p2"] is None


def test_intersection_tightens(follows_cat):
    # Constrain both ends: p1=Mahinda (RID 0) and p2=Zhang (RID 3).
    sets = propagate({"p1": np.array([0]), "f": None, "p2": np.array([3])},
                     _spec(), follows_cat)
    # Mahinda's follows rows {0,2,4}; rows pointing at Zhang: {1,4} -> {4}.
    assert sets["f"].tolist() == [4]


def test_all_none_stays_none(follows_cat):
    sets = propagate({"p1": None, "f": None, "p2": None}, _spec(), follows_cat)
    assert all(v is None for v in sets.values())


def test_empty_set_propagates_to_empty(follows_cat):
    sets = propagate({"p1": np.array([], dtype=np.int64), "f": None, "p2": None},
                     _spec(), follows_cat)
    assert sets["f"].size == 0 and sets["p2"].size == 0


def test_superset_property_vs_exact_join(follows_cat):
    """Propagated sets must contain every RID that actually joins."""
    import duckdb

    sets = propagate({"p1": np.array([1]), "f": None, "p2": None}, _spec(),
                     follows_cat)
    con = duckdb.connect()
    p = follows_cat.table("person").pdf
    f = follows_cat.table("follows").pdf
    con.register("p", p)
    con.register("f", f)
    exact = con.execute(
        "SELECT DISTINCT f._rid FROM p p1, f, p p2 "
        "WHERE p1.ID = f.ID1 AND f.ID2 = p2.ID AND p1._rid = 1"
    ).fetchdf()["_rid"].to_numpy()
    con.close()
    assert set(exact) <= set(sets["f"].tolist())


def test_fk_fk_edge_propagation(snb_cat):
    # k1.person2id = k2.person1id (both FKs to person).
    spec = QuerySpec(
        name="kk",
        tables=[TableRef("p1", "person"), TableRef("k1", "knows"),
                TableRef("k2", "knows")],
        joins=[JoinEdge.of("p1.personid", "k1.person1id"),
               JoinEdge.of("k1.person2id", "k2.person1id")],
        filters=["p1.id = 933"],
        select=[("k2.creationdate", "d")],
    )
    sets = propagate({"p1": np.array([0]), "k1": None, "k2": None}, spec, snb_cat)
    n_k = snb_cat.table("knows").n_rows
    assert sets["k1"] is not None and 0 < len(sets["k1"]) < n_k
    assert sets["k2"] is not None and len(sets["k2"]) < n_k
    # Exactness of the chain start: k1 rows are exactly person 0's edges.
    k = snb_cat.table("knows").pdf
    expect = set(k.index[k["person1id"] == 0].tolist())
    assert set(sets["k1"].tolist()) == expect
