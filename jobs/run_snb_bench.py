"""Tables 5 & 6: SNB-M end-to-end — DuckDB vs GRainDB vs GraphflowDB-style INLJ.

Usage: spark-submit jobs/run_snb_bench.py   (or: python jobs/run_snb_bench.py)
Env: REPRO_SNB_SCALE, REPRO_RUNS, REPRO_WARMUP.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))

from common import build_session, emit  # noqa: E402

from repro.bench import harness  # noqa: E402
from repro.bench.runners import make_runners  # noqa: E402
from repro.bench.workloads_snb import specs  # noqa: E402
from repro.data.snb import snb_catalog  # noqa: E402


def run(spark, scale: float = harness.SNB_SCALE):
    cat = snb_catalog(spark, scale=scale, seed=7)
    runners = make_runners(spark, cat, ["DuckDB", "GRainDB", "GraphflowDB"])
    df = harness.run_suite(specs(), runners)
    text = "\n".join([
        f"# Tables 5 & 6 — SNB-M (scale={scale}, runs={harness.RUNS})", "",
        "## Table 5: percentiles (ms)",
        harness.to_markdown(harness.percentile_table(df)), "",
        "## Table 6: per-query (ms) — GRainDB vs DuckDB",
        harness.to_markdown(harness.per_query_table(df, "DuckDB", "GRainDB")), "",
        "## Table 6: per-query (ms) — GraphflowDB vs DuckDB",
        harness.to_markdown(harness.per_query_table(df, "DuckDB", "GraphflowDB")), "",
    ])
    emit("table5_6_snb", text)
    cat.unpersist()
    return df


if __name__ == "__main__":
    spark = build_session("snb-bench")
    run(spark)
    spark.stop()
