"""System runners: one callable per compared system over a shared catalog."""
from __future__ import annotations

from typing import Callable

from pyspark.sql import SparkSession

from repro.core.catalog import Catalog
from repro.core.rewrite import CONFIGS
from repro.exec.executor import ExecOutcome, PlanExecutor
from repro.exec.inlj import GraphExecutor
from repro.plan.spec import QuerySpec


def make_runners(
    spark: SparkSession,
    catalog: Catalog,
    systems: list[str],
) -> dict[str, Callable[[QuerySpec], ExecOutcome]]:
    """Build runner callables for the requested systems.

    Systems: 'DuckDB', 'GRainDB', 'GRainDB-JM', 'GRainDB-JM-RSJ' (the
    relational executor under the corresponding rewrite config) and
    'GraphflowDB' (the INLJ executor).
    """
    pex = PlanExecutor(spark, catalog)
    gex = GraphExecutor(spark, catalog)
    out: dict[str, Callable[[QuerySpec], ExecOutcome]] = {}
    for s in systems:
        if s == "GraphflowDB":
            out[s] = gex.execute
        elif s in CONFIGS:
            out[s] = (lambda mode: lambda spec: pex.execute(spec, mode=mode))(s)
        else:
            raise ValueError(f"unknown system {s!r}")
    return out
