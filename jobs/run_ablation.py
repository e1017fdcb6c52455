"""Table 10: ablation study on SNB-M — DuckDB / −JM−RSJ / −JM / full GRainDB.

Usage: spark-submit jobs/run_ablation.py
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

LEVELS = ["DuckDB", "GRainDB-JM-RSJ", "GRainDB-JM", "GRainDB"]


def run(spark, scale: float = harness.SNB_SCALE):
    cat = snb_catalog(spark, scale=scale, seed=7)
    runners = make_runners(spark, cat, LEVELS)
    df = harness.run_suite(specs(), runners)
    pivot = df.pivot_table(index="query", columns="system", values="ms",
                           sort=False)[LEVELS].reset_index()
    text = "\n".join([
        f"# Table 10 — ablation on SNB-M (scale={scale}, runs={harness.RUNS})", "",
        "## Percentiles (ms) per optimization level",
        harness.to_markdown(harness.percentile_table(df)), "",
        "## Per-query runtimes (ms) per optimization level",
        harness.to_markdown(pivot), "",
    ])
    emit("table10_ablation", text)
    cat.unpersist()
    return df


if __name__ == "__main__":
    spark = build_session("ablation")
    run(spark)
    spark.stop()
