"""Test helpers: run a spec under a system mode and oracle-check the result."""
from __future__ import annotations

from repro.core.catalog import Catalog
from repro.exec.executor import ExecOutcome, PlanExecutor
from repro.exec.inlj import GraphExecutor
from repro.oracle import assert_equivalent
from repro.plan.spec import QuerySpec

RELATIONAL_MODES = ["DuckDB", "GRainDB-JM-RSJ", "GRainDB-JM", "GRainDB"]
ALL_SYSTEMS = RELATIONAL_MODES + ["GraphflowDB"]


def run_system(spark, catalog: Catalog, spec: QuerySpec, system: str,
               collect: bool = False) -> ExecOutcome:
    if system == "GraphflowDB":
        return GraphExecutor(spark, catalog).execute(spec, collect=collect)
    return PlanExecutor(spark, catalog).execute(spec, mode=system, collect=collect)


def oracle_check(spark, catalog: Catalog, spec: QuerySpec, system: str) -> ExecOutcome:
    """Execute under ``system`` and diff against DuckDB running the spec's SQL
    over the original (pre-RID) tables."""
    out = run_system(spark, catalog, spec, system, collect=False)
    names = {t.table for t in spec.tables}
    tables = {k: v for k, v in catalog.oracle_tables().items() if k in names}
    assert_equivalent(out.df, spec.to_sql(), **tables)
    return out
