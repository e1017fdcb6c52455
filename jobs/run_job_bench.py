"""Tables 3, 4 & 8: JOB-lite end-to-end — DuckDB vs GRainDB.

Usage: spark-submit jobs/run_job_bench.py
Env: REPRO_JOB_SCALE, REPRO_RUNS, REPRO_WARMUP.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))

from common import build_session, emit  # noqa: E402

from repro.bench import harness  # noqa: E402
from repro.bench.runners import make_runners  # noqa: E402
from repro.bench.workloads_job import first_variants  # noqa: E402
from repro.data.imdb import imdb_catalog  # noqa: E402


def run(spark, scale: float = harness.JOB_SCALE):
    cat = imdb_catalog(spark, scale=scale, seed=11)
    runners = make_runners(spark, cat, ["DuckDB", "GRainDB"])
    df = harness.run_suite(first_variants(), runners)
    text = "\n".join([
        f"# Tables 3 & 4 — JOB-lite (scale={scale}, runs={harness.RUNS})", "",
        "## Table 3: percentiles (ms)",
        harness.to_markdown(harness.percentile_table(df)), "",
        "## Table 4: per-query (ms) with scan reduction",
        harness.to_markdown(harness.per_query_table(df, "DuckDB", "GRainDB")), "",
    ])
    emit("table3_4_job", text)
    cat.unpersist()
    return df


if __name__ == "__main__":
    spark = build_session("job-bench")
    run(spark)
    spark.stop()
