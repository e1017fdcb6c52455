"""TPC-H-lite: the 22 TPC-H queries as QuerySpecs (Table 9's sanity check).

The paper runs unmodified TPC-H; our spec language is conjunctive
select-project-join-aggregate, so queries with correlated/nested subqueries
are flattened to their join-filter-aggregate cores (the part that exercises
the predefined-join machinery). Every simplification is noted inline; the
oracle runs the *same* simplified SQL, so correctness is still exact. The
workload's role in the paper — mostly non-selective one-to-many joins where
GRainDB should show neither big wins nor overheads — is preserved.
"""
from __future__ import annotations

from repro.plan.spec import JoinEdge, QuerySpec, TableRef

T, J = TableRef, JoinEdge.of

_L, _O, _C, _P, _S, _PS = (
    T("l", "lineitem"), T("o", "orders"), T("c", "customer"),
    T("p", "part"), T("s", "supplier"), T("ps", "partsupp"),
)
_N, _R = T("n", "nation"), T("r", "region")


def _q(name, tables, joins, filters, select, group_by=()) -> QuerySpec:
    return QuerySpec(name=name, tables=tables, joins=joins, filters=filters,
                     select=select, group_by=list(group_by))


def specs() -> dict[str, QuerySpec]:
    qs = [
        # Q1: pricing summary (verbatim core).
        _q("Q1", [_L], [],
           ["l.l_shipdate <= timestamp '1998-09-02'"],
           [("l.l_returnflag", "returnflag"), ("l.l_linestatus", "linestatus"),
            ("sum(l.l_quantity)", "sum_qty"),
            ("sum(l.l_extendedprice)", "sum_base_price"),
            ("sum(l.l_extendedprice * (1 - l.l_discount))", "sum_disc_price"),
            ("count(*)", "count_order")],
           group_by=("returnflag", "linestatus")),
        # Q2: min-cost supplier — correlated min over partsupp flattened to the
        # join core (the paper's 2.6x TPC-H winner: selective part predicate
        # through the many-to-many partsupp).
        _q("Q2", [_P, _PS, _S, _N, _R],
           [J("p.p_partkey", "ps.ps_partkey"), J("ps.ps_suppkey", "s.s_suppkey"),
            J("s.s_nationkey", "n.n_nationkey"), J("n.n_regionkey", "r.r_regionkey")],
           ["p.p_size = 15", "p.p_type = 'LARGE'", "r.r_name = 'EUROPE'"],
           [("min(ps.ps_supplycost)", "min_cost"), ("min(s.s_acctbal)", "min_bal"),
            ("count(*)", "cnt")], group_by=()),
        # Q3: shipping priority — per-order grouping reduced to the filtered
        # join + global revenue (top-k ORDER BY/LIMIT is out of scope).
        _q("Q3", [_C, _O, _L],
           [J("c.c_custkey", "o.o_custkey"), J("l.l_orderkey", "o.o_orderkey")],
           ["c.c_mktsegment = 'BUILDING'",
            "o.o_orderdate < timestamp '1995-03-15'",
            "l.l_shipdate > timestamp '1995-03-15'"],
           [("sum(l.l_extendedprice * (1 - l.l_discount))", "revenue"),
            ("count(*)", "cnt")], group_by=()),
        # Q4: order-priority check — EXISTS flattened to a join + distinct-count.
        _q("Q4", [_O, _L],
           [J("l.l_orderkey", "o.o_orderkey")],
           ["o.o_orderdate >= timestamp '1993-07-01'",
            "o.o_orderdate < timestamp '1993-10-01'",
            "l.l_commitdate < l.l_receiptdate"],
           [("o.o_orderpriority", "orderpriority"),
            ("count(distinct o.o_orderkey)", "order_count")],
           group_by=("orderpriority",)),
        # Q5: local supplier volume (verbatim core, minus the c/s same-nation
        # predicate folded in as a residual filter).
        _q("Q5", [_C, _O, _L, _S, _N, _R],
           [J("c.c_custkey", "o.o_custkey"), J("l.l_orderkey", "o.o_orderkey"),
            J("l.l_suppkey", "s.s_suppkey"), J("s.s_nationkey", "n.n_nationkey"),
            J("n.n_regionkey", "r.r_regionkey")],
           ["r.r_name = 'ASIA'", "o.o_orderdate >= timestamp '1994-01-01'",
            "o.o_orderdate < timestamp '1995-01-01'",
            "c.c_nationkey = s.s_nationkey"],
           [("n.n_name", "nation"),
            ("sum(l.l_extendedprice * (1 - l.l_discount))", "revenue")],
           group_by=("nation",)),
        # Q6: forecast revenue change (verbatim).
        _q("Q6", [_L], [],
           ["l.l_shipdate >= timestamp '1994-01-01'",
            "l.l_shipdate < timestamp '1995-01-01'",
            "l.l_discount between 0.05 and 0.07", "l.l_quantity < 24"],
           [("sum(l.l_extendedprice * l.l_discount)", "revenue")], group_by=()),
        # Q7: volume shipping — the two-nation OR pair kept as a residual filter.
        _q("Q7", [_S, _L, _O, _C, _N],
           [J("s.s_suppkey", "l.l_suppkey"), J("o.o_orderkey", "l.l_orderkey"),
            J("c.c_custkey", "o.o_custkey"), J("s.s_nationkey", "n.n_nationkey")],
           ["n.n_name in ('FRANCE', 'GERMANY')",
            "l.l_shipdate >= timestamp '1995-01-01'",
            "l.l_shipdate < timestamp '1996-12-31'"],
           [("n.n_name", "supp_nation"),
            ("sum(l.l_extendedprice * (1 - l.l_discount))", "revenue")],
           group_by=("supp_nation",)),
        # Q8: national market share — numerator join core.
        _q("Q8", [_P, _L, _O, _C, _N, _R],
           [J("p.p_partkey", "l.l_partkey"), J("l.l_orderkey", "o.o_orderkey"),
            J("o.o_custkey", "c.c_custkey"), J("c.c_nationkey", "n.n_nationkey"),
            J("n.n_regionkey", "r.r_regionkey")],
           ["r.r_name = 'AMERICA'", "p.p_type = 'ECONOMY'",
            "o.o_orderdate >= timestamp '1995-01-01'",
            "o.o_orderdate < timestamp '1996-12-31'"],
           [("sum(l.l_extendedprice * (1 - l.l_discount))", "volume"),
            ("count(*)", "cnt")], group_by=()),
        # Q9: product type profit — p_name LIKE over the 5% 'green' parts.
        _q("Q9", [_P, _L, _S, _N],
           [J("p.p_partkey", "l.l_partkey"), J("l.l_suppkey", "s.s_suppkey"),
            J("s.s_nationkey", "n.n_nationkey")],
           ["p.p_name like '%green%'"],
           [("n.n_name", "nation"),
            ("sum(l.l_extendedprice * (1 - l.l_discount))", "profit")],
           group_by=("nation",)),
        # Q10: returned-item reporting — per-customer grouping reduced to
        # per-nation (bounded output; same join work).
        _q("Q10", [_C, _O, _L, _N],
           [J("c.c_custkey", "o.o_custkey"), J("l.l_orderkey", "o.o_orderkey"),
            J("c.c_nationkey", "n.n_nationkey")],
           ["o.o_orderdate >= timestamp '1993-10-01'",
            "o.o_orderdate < timestamp '1994-01-01'", "l.l_returnflag = 'R'"],
           [("n.n_name", "nation"),
            ("sum(l.l_extendedprice * (1 - l.l_discount))", "revenue")],
           group_by=("nation",)),
        # Q11: important stock — HAVING over a scalar subquery dropped;
        # grouped value kept.
        _q("Q11", [_PS, _S, _N],
           [J("ps.ps_suppkey", "s.s_suppkey"), J("s.s_nationkey", "n.n_nationkey")],
           ["n.n_name = 'GERMANY'"],
           [("sum(ps.ps_supplycost * ps.ps_availqty)", "value"),
            ("count(*)", "cnt")], group_by=()),
        # Q12: shipping modes (verbatim core; CASE sums → counts).
        _q("Q12", [_O, _L],
           [J("l.l_orderkey", "o.o_orderkey")],
           ["l.l_shipmode in ('MAIL', 'SHIP')",
            "l.l_commitdate < l.l_receiptdate",
            "l.l_shipdate < l.l_commitdate",
            "l.l_receiptdate >= timestamp '1994-01-01'",
            "l.l_receiptdate < timestamp '1995-01-01'"],
           [("l.l_shipmode", "shipmode"), ("count(*)", "line_count")],
           group_by=("shipmode",)),
        # Q13: customer distribution — LEFT OUTER JOIN is out of scope; inner
        # join + per-priority counts keeps the join shape.
        _q("Q13", [_C, _O],
           [J("c.c_custkey", "o.o_custkey")],
           [],
           [("o.o_orderpriority", "priority"), ("count(*)", "cnt")],
           group_by=("priority",)),
        # Q14: promotion effect — CASE ratio reduced to PROMO revenue.
        _q("Q14", [_L, _P],
           [J("l.l_partkey", "p.p_partkey")],
           ["l.l_shipdate >= timestamp '1995-09-01'",
            "l.l_shipdate < timestamp '1995-10-01'", "p.p_type = 'PROMO'"],
           [("sum(l.l_extendedprice * (1 - l.l_discount))", "promo_revenue")],
           group_by=()),
        # Q15: top supplier — the view + max() reduced to per-supplier revenue
        # over the date window (the heavy part).
        _q("Q15", [_L, _S],
           [J("l.l_suppkey", "s.s_suppkey")],
           ["l.l_shipdate >= timestamp '1996-01-01'",
            "l.l_shipdate < timestamp '1996-04-01'"],
           [("max(l.l_extendedprice * (1 - l.l_discount))", "max_rev"),
            ("count(distinct s.s_suppkey)", "n_supp")], group_by=()),
        # Q16: parts/supplier relationship — NOT IN supplier subquery dropped.
        _q("Q16", [_PS, _P],
           [J("ps.ps_partkey", "p.p_partkey")],
           ["p.p_brand != 'Brand#45'", "p.p_type != 'MEDIUM'",
            "p.p_size in (9, 19, 49)"],
           [("p.p_brand", "brand"),
            ("count(distinct ps.ps_suppkey)", "supplier_cnt")],
           group_by=("brand",)),
        # Q17: small-quantity-order revenue — correlated avg replaced by its
        # fixed expectation (quantity uniform on 1..50 → 0.2*avg ≈ 5).
        _q("Q17", [_L, _P],
           [J("l.l_partkey", "p.p_partkey")],
           ["p.p_brand = 'Brand#23'", "p.p_container = 'MED BOX'",
            "l.l_quantity < 5"],
           [("sum(l.l_extendedprice)", "avg_yearly")], group_by=()),
        # Q18: large-volume customer — HAVING sum(qty)>300 approximated by the
        # high-quantity line filter.
        _q("Q18", [_C, _O, _L],
           [J("c.c_custkey", "o.o_custkey"), J("o.o_orderkey", "l.l_orderkey")],
           ["l.l_quantity > 49"],
           [("count(*)", "cnt"), ("sum(l.l_quantity)", "sum_qty")], group_by=()),
        # Q19: discounted revenue — the three OR-brackets kept verbatim as one
        # residual multi-table predicate.
        _q("Q19", [_L, _P],
           [J("p.p_partkey", "l.l_partkey")],
           ["l.l_shipinstruct = 'DELIVER IN PERSON'",
            "l.l_shipmode in ('AIR', 'REG AIR')",
            "(p.p_brand = 'Brand#12' and p.p_container in ('SM CASE', 'SM BOX') "
            "and l.l_quantity between 1 and 11) or "
            "(p.p_brand = 'Brand#23' and p.p_container in ('MED BAG', 'MED BOX') "
            "and l.l_quantity between 10 and 20) or "
            "(p.p_brand = 'Brand#34' and p.p_container in ('LG CASE', 'LG BOX') "
            "and l.l_quantity between 20 and 30)"],
           [("sum(l.l_extendedprice * (1 - l.l_discount))", "revenue")],
           group_by=()),
        # Q20: potential part promotion — nested IN-chain flattened to the join
        # core over s/n/ps/p.
        _q("Q20", [_S, _N, _PS, _P],
           [J("s.s_nationkey", "n.n_nationkey"), J("ps.ps_suppkey", "s.s_suppkey"),
            J("ps.ps_partkey", "p.p_partkey")],
           ["n.n_name = 'CANADA'", "p.p_name like '%forest%'"],
           [("count(distinct s.s_suppkey)", "n_supp")], group_by=()),
        # Q21: waiting suppliers — EXISTS/NOT EXISTS self-joins dropped; the
        # s⋈l⋈o⋈n core with the late-delivery predicate kept.
        _q("Q21", [_S, _L, _O, _N],
           [J("s.s_suppkey", "l.l_suppkey"), J("o.o_orderkey", "l.l_orderkey"),
            J("s.s_nationkey", "n.n_nationkey")],
           ["o.o_orderstatus = 'F'", "l.l_receiptdate > l.l_commitdate",
            "n.n_name = 'SAUDI ARABIA'"],
           [("count(*)", "numwait")], group_by=()),
        # Q22: global sales opportunity — anti-join dropped; phone-prefix
        # aggregation kept.
        _q("Q22", [_C], [],
           ["substring(c.c_phone, 1, 2) in ('13', '31', '23', '29', '30', '18', '17')",
            "c.c_acctbal > 0.0"],
           [("count(*)", "numcust"), ("sum(c.c_acctbal)", "totacctbal")],
           group_by=()),
    ]
    return {q.name: q for q in qs}
