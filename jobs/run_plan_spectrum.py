"""Table 7 (+ Figures 6/10 data): plan-spectrum study on JOB Q1a/b–Q6a/b.

Usage: spark-submit jobs/run_plan_spectrum.py
Env: REPRO_JOB_SCALE, REPRO_SPECTRUM_PLANS (orders per query, default 8).
"""
import os
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))

from common import build_session, emit  # noqa: E402

from repro.bench import harness  # noqa: E402
from repro.bench.spectrum import table7  # noqa: E402
from repro.bench.workloads_job import spectrum_queries  # noqa: E402
from repro.data.imdb import imdb_catalog  # noqa: E402


def run(spark, scale: float = harness.JOB_SCALE):
    max_plans = int(os.environ.get("REPRO_SPECTRUM_PLANS", "8"))
    cat = imdb_catalog(spark, scale=scale, seed=11)
    per_plan, summary = table7(spark, cat, spectrum_queries(),
                               max_plans=max_plans, runs=1)
    text = "\n".join([
        f"# Table 7 — plan spectrum (scale={scale}, ≤{max_plans} orders/query)", "",
        "## Summary: P*_Duck vs P*_opt, plus spectrum extremes",
        harness.to_markdown(summary), "",
        "## All enumerated plans",
        harness.to_markdown(per_plan), "",
    ])
    emit("table7_spectrum", text)
    cat.unpersist()
    return summary


if __name__ == "__main__":
    spark = build_session("plan-spectrum")
    run(spark)
    spark.stop()
