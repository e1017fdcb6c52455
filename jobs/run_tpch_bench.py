"""Table 9: TPC-H-lite sanity check — DuckDB vs GRainDB.

Usage: spark-submit jobs/run_tpch_bench.py
Env: REPRO_TPCH_SF, REPRO_RUNS, REPRO_WARMUP.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))

from common import build_session, emit  # noqa: E402

from repro.bench import harness  # noqa: E402
from repro.bench.runners import make_runners  # noqa: E402
from repro.bench.workloads_tpch import specs  # noqa: E402
from repro.data.tpch import tpch_catalog  # noqa: E402


def run(spark, sf: float = harness.TPCH_SF):
    cat = tpch_catalog(spark, sf=sf, seed=21)
    runners = make_runners(spark, cat, ["DuckDB", "GRainDB"])
    df = harness.run_suite(specs(), runners)
    text = "\n".join([
        f"# Table 9 — TPC-H-lite (sf={sf}, runs={harness.RUNS})", "",
        "## Percentiles (ms)",
        harness.to_markdown(harness.percentile_table(df)), "",
        "## Per-query (ms)",
        harness.to_markdown(harness.per_query_table(df, "DuckDB", "GRainDB")), "",
    ])
    emit("table9_tpch", text)
    cat.unpersist()
    return df


if __name__ == "__main__":
    spark = build_session("tpch-bench")
    run(spark)
    spark.stop()
