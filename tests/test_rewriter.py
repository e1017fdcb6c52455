"""Unit tests for the GRainDB rewrite rules (paper §4 Step 1, §5.1, §5.2)."""
import pytest

from repro.core.catalog import RID
from repro.core.rewrite import (
    CONFIGS,
    DUCK,
    GRAIN_FULL,
    GRAIN_NO_JM,
    GRAIN_RID_ONLY,
    GrainConfig,
    rewrite_plan,
)
from repro.plan.nodes import JoinNode, MergeJoinNode, ScanNode, joins_of, scans_of
from repro.plan.optimizer import greedy_plan, plan_from_order
from repro.plan.spec import JoinEdge, QuerySpec, TableRef


def _one_hop(select=None, filters=None):
    return QuerySpec(
        name="one_hop",
        tables=[TableRef("p1", "person"), TableRef("f", "follows"),
                TableRef("p2", "person")],
        joins=[JoinEdge.of("p1.ID", "f.ID1"), JoinEdge.of("f.ID2", "p2.ID")],
        filters=filters if filters is not None else ["p1.name = 'Karim'"],
        select=select or [("p2.name", "n2")],
    )


def test_config_labels():
    assert GRAIN_FULL.label == "GRainDB"
    assert GRAIN_NO_JM.label == "GRainDB-JM"
    assert GRAIN_RID_ONLY.label == "GRainDB-JM-RSJ"
    assert DUCK.label == "DuckDB"
    assert set(CONFIGS) == {"GRainDB", "GRainDB-JM", "GRainDB-JM-RSJ", "DuckDB"}


def test_duck_mode_untouched(follows_cat):
    spec = _one_hop()
    plan = rewrite_plan(greedy_plan(spec, follows_cat), spec, follows_cat, DUCK)
    for j in joins_of(plan):
        assert isinstance(j, JoinNode)
        assert j.kind == "hash" and not j.sips
        for (la, lc), (ra, rc) in j.conds:
            assert not lc.startswith("_rid") and not rc.startswith("_rid")


def test_rid_only_rewrites_conditions(follows_cat):
    spec = _one_hop()
    plan = rewrite_plan(greedy_plan(spec, follows_cat), spec, follows_cat,
                        GRAIN_RID_ONLY)
    kinds = {j.kind for j in joins_of(plan)}
    assert kinds <= {"sjoin", "hash_rid"}
    # Every predefined cond became a RID equality.
    for j in joins_of(plan):
        for (la, lc), (ra, rc) in j.conds:
            assert lc == RID or lc.startswith("_rid_") or rc == RID


def test_case1_direct_sip(follows_cat):
    # p1 filtered -> build side holds p1 ⋈ f (with F's rid col) -> sip to p2.
    spec = _one_hop()
    order = ["p1", "f", "p2"]
    plan = rewrite_plan(plan_from_order(spec, follows_cat, order), spec,
                        follows_cat, GRAIN_NO_JM)
    top = plan
    assert top.kind == "sjoin"
    [sip] = top.sips
    assert sip.kind == "direct" and sip.target_alias == "p2"
    assert sip.source_alias == "f" and sip.source_col == "_rid_person__ID2"


def test_case2_reverse_semijoin_with_index(follows_cat):
    # Order p2, f last from p1's side: p1 build, f probe -> needs index (have it).
    spec = _one_hop()
    plan = rewrite_plan(plan_from_order(spec, follows_cat, ["p1", "f", "p2"]),
                        spec, follows_cat, GRAIN_NO_JM)
    inner = plan.left if isinstance(plan.left, JoinNode) else plan.right
    assert inner.kind == "sjoin_idxr"
    [sip] = inner.sips
    assert sip.kind == "index" and sip.target_alias == "f"
    assert sip.index_key == ("follows", ("ID1",))


def test_case2_no_index_degrades_to_hash_rid(spark):
    import pandas as pd

    from repro.core.catalog import Catalog

    cat = Catalog(spark, zone_size=2)
    cat.register("p", pd.DataFrame({"k": [1, 2], "name": ["a", "b"]}))
    cat.register("f", pd.DataFrame({"fk": [1, 2, 1], "w": [1, 2, 3]}))
    cat.predefine_join("f", ["fk"], "p", ["k"])  # no RID index
    cat.finalize()
    spec = QuerySpec(
        name="q", tables=[TableRef("p", "p"), TableRef("f", "f")],
        joins=[JoinEdge.of("f.fk", "p.k")], filters=["p.name = 'a'"],
        select=[("f.w", "w")],
    )
    plan = rewrite_plan(plan_from_order(spec, cat, ["p", "f"]), spec, cat, GRAIN_FULL)
    assert plan.kind == "hash_rid" and not plan.sips
    cat.unpersist()


def test_join_merging_applies(follows_cat):
    spec = _one_hop()  # f unfiltered, f columns not projected
    plan = rewrite_plan(greedy_plan(spec, follows_cat), spec, follows_cat, GRAIN_FULL)
    merged = [n for n in joins_of(plan) if isinstance(n, MergeJoinNode)]
    assert len(merged) == 1
    m = merged[0]
    assert m.f_alias == "f" and {m.p1_alias, m.p2_alias} == {"p1", "p2"}
    assert all(s.alias != "f" for s in scans_of(plan))  # F never scanned


def test_join_merging_blocked_by_projection(follows_cat):
    spec = _one_hop(select=[("p2.name", "n2"), ("f.year", "y")])
    plan = rewrite_plan(greedy_plan(spec, follows_cat), spec, follows_cat, GRAIN_FULL)
    assert not any(isinstance(n, MergeJoinNode) for n in joins_of(plan))


def test_join_merging_blocked_by_filter_on_f(follows_cat):
    spec = _one_hop(filters=["p1.name = 'Karim'", "f.year = 2021"])
    plan = rewrite_plan(greedy_plan(spec, follows_cat), spec, follows_cat, GRAIN_FULL)
    assert not any(isinstance(n, MergeJoinNode) for n in joins_of(plan))


def test_join_merging_disabled_by_config(follows_cat):
    spec = _one_hop()
    plan = rewrite_plan(greedy_plan(spec, follows_cat), spec, follows_cat, GRAIN_NO_JM)
    assert not any(isinstance(n, MergeJoinNode) for n in joins_of(plan))


def test_value_joins_left_alone(spark):
    import pandas as pd

    from repro.core.catalog import Catalog

    cat = Catalog(spark)
    cat.register("a", pd.DataFrame({"x": [1, 2]}))
    cat.register("b", pd.DataFrame({"x": [1, 2, 2]}))
    cat.finalize()  # nothing predefined
    spec = QuerySpec(
        name="q", tables=[TableRef("a", "a"), TableRef("b", "b")],
        joins=[JoinEdge.of("a.x", "b.x")], select=[("b.x", "bx")],
    )
    plan = rewrite_plan(greedy_plan(spec, cat), spec, cat, GRAIN_FULL)
    assert plan.kind == "hash" and not plan.sips
    cat.unpersist()


def test_custom_config_combination():
    cfg = GrainConfig(rid_materialization=True, reverse_semijoin=False,
                      join_merging=False)
    assert cfg.label == "GRainDB-JM-RSJ"
