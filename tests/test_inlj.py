"""INLJ (GDBMS-style) executor tests: extends, lookups, property reads,
binding-order overrides — oracle-checked against the same specs."""
import pytest

from repro.exec.inlj import GraphExecutor, _derive_order
from repro.plan.spec import JoinEdge, QuerySpec, TableRef
from tests.util import oracle_check


def _one_hop(select=None, filters=None, **kw):
    return QuerySpec(
        name="hop",
        tables=[TableRef("p1", "person"), TableRef("f", "follows"),
                TableRef("p2", "person")],
        joins=[JoinEdge.of("p1.ID", "f.ID1"), JoinEdge.of("f.ID2", "p2.ID")],
        filters=filters if filters is not None else ["p1.name = 'Mahinda'"],
        select=select or [("p2.name", "n2"), ("f.year", "y")],
        **kw,
    )


def test_derive_order_seed_is_most_selective(follows_cat):
    binds = _derive_order(_one_hop(), follows_cat)
    assert binds[0].kind == "scan" and binds[0].alias == "p1"


def test_derive_order_extend_cobinds_dst(follows_cat):
    binds = _derive_order(_one_hop(), follows_cat)
    ext = [b for b in binds if b.kind == "extend"]
    assert len(ext) == 1 and ext[0].alias == "f" and ext[0].dst == "p2"
    assert ext[0].index_key == ("follows", ("ID1",))


def test_graph_seed_override(follows_cat):
    spec = _one_hop(graph_seed="p2")
    binds = _derive_order(spec, follows_cat)
    assert binds[0].alias == "p2"
    # Reverse traversal uses the backward index (keyed by ID2).
    ext = [b for b in binds if b.kind == "extend"][0]
    assert ext.index_key == ("follows", ("ID2",))


def test_graph_order_override(follows_cat):
    spec = _one_hop(graph_seed="p1", graph_order=["f", "p2"])
    binds = _derive_order(spec, follows_cat)
    assert [b.alias for b in binds] == ["p1", "f"]  # p2 co-bound by the extend


def test_inlj_one_hop_result(spark, follows_cat):
    oracle_check(spark, follows_cat, _one_hop(), "GraphflowDB")


def test_inlj_edge_filter_after_extension(spark, follows_cat):
    # Filter on the relationship table: properties read after the join.
    oracle_check(spark, follows_cat,
                 _one_hop(filters=["p1.name = 'Mahinda'", "f.year = 2021"]),
                 "GraphflowDB")


def test_inlj_unfiltered_full_graph(spark, follows_cat):
    oracle_check(spark, follows_cat, _one_hop(filters=[]), "GraphflowDB")


def test_inlj_aggregate(spark, follows_cat):
    spec = _one_hop(select=[("count(*)", "cnt"), ("min(p2.name)", "mn")],
                    filters=[], group_by=[])
    oracle_check(spark, follows_cat, spec, "GraphflowDB")


def test_inlj_two_hop_path(spark, follows_cat):
    spec = QuerySpec(
        name="hop2",
        tables=[TableRef("p1", "person"), TableRef("f1", "follows"),
                TableRef("p2", "person"), TableRef("f2", "follows"),
                TableRef("p3", "person")],
        joins=[JoinEdge.of("p1.ID", "f1.ID1"), JoinEdge.of("f1.ID2", "p2.ID"),
               JoinEdge.of("p2.ID", "f2.ID1"), JoinEdge.of("f2.ID2", "p3.ID")],
        filters=["p1.name = 'Mahinda'"],
        select=[("p3.name", "n3")],
    )
    oracle_check(spark, follows_cat, spec, "GraphflowDB")


def test_inlj_star_pattern(spark, follows_cat):
    # p1 with two independent follow edges (a star, not a path) — the case
    # GR-Fusion's PathScan cannot express but left-deep INLJ still can.
    spec = QuerySpec(
        name="star",
        tables=[TableRef("p1", "person"), TableRef("f1", "follows"),
                TableRef("f2", "follows"), TableRef("p2", "person"),
                TableRef("p3", "person")],
        joins=[JoinEdge.of("p1.ID", "f1.ID1"), JoinEdge.of("p1.ID", "f2.ID1"),
               JoinEdge.of("f1.ID2", "p2.ID"), JoinEdge.of("f2.ID2", "p3.ID")],
        filters=["p1.name = 'Mahinda'"],
        select=[("p2.name", "n2"), ("p3.name", "n3")],
    )
    oracle_check(spark, follows_cat, spec, "GraphflowDB")


def test_inlj_scans_are_full_tables(spark, follows_cat):
    from tests.util import run_system

    out = run_system(spark, follows_cat, _one_hop(), "GraphflowDB", collect=True)
    # No SIP in GDBMS mode: every touched table is read in full.
    for alias, n in out.metrics.scanned.items():
        assert n == out.metrics.table_rows[alias]
