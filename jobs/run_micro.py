"""Figure 5 data: MICRO-P / MICRO-K selectivity sweep (§7.3.2).

Usage: spark-submit jobs/run_micro.py
Env: REPRO_SNB_SCALE, REPRO_RUNS.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))

from common import build_session, emit  # noqa: E402

from repro.bench import harness  # noqa: E402
from repro.bench.micro import run_micro  # noqa: E402
from repro.data.snb import snb_catalog  # noqa: E402


def run(spark, scale: float = harness.SNB_SCALE):
    cat = snb_catalog(spark, scale=scale, seed=7)
    df = run_micro(spark, cat, runs=harness.RUNS)
    pivots = []
    for sweep in ("MICRO-P", "MICRO-K"):
        p = df[df.sweep == sweep].pivot_table(
            index="selectivity", columns="system", values="ms"
        ).reset_index()
        pivots += [f"## {sweep} (ms by selectivity)", harness.to_markdown(p), ""]
    emit("micro_figure5",
         "\n".join([f"# MICRO-P / MICRO-K (scale={scale})", ""] + pivots))
    cat.unpersist()
    return df


if __name__ == "__main__":
    spark = build_session("micro")
    run(spark)
    spark.stop()
