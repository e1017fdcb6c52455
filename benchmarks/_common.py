"""Shared helpers for the per-table pytest-benchmark files.

Each paper table gets one bench file; each compared system is one benchmark
case whose measured callable runs the whole workload once (per-query timings
are recorded on the side). After the last system of a table finishes, the
full table is rendered to ``results/<table>.md`` so a bench run regenerates
the EXPERIMENTS.md artifacts.
"""
from __future__ import annotations

import os
from pathlib import Path

import pandas as pd

from repro.bench import harness

RESULTS_DIR = Path(os.environ.get("REPRO_RESULTS_DIR", Path(__file__).resolve().parent.parent / "results"))


def run_workload_once(specs, runner) -> pd.DataFrame:
    """One measured pass over a workload for one system (per-query timings)."""
    return harness.run_suite(specs, {"sys": runner}, warmup=0, runs=1)


def bench_system(benchmark, specs, runner, store: dict, system: str) -> None:
    """Benchmark one system over a workload and stash its per-query frame."""

    def once():
        store[system] = run_workload_once(specs, runner)

    benchmark.pedantic(once, rounds=1, iterations=1, warmup_rounds=1)


def write_table(store: dict[str, pd.DataFrame], name: str,
                baseline: str | None = None, contender: str | None = None) -> Path:
    """Render percentile + per-query markdown for a finished table run."""
    frames = []
    for system, df in store.items():
        d = df.copy()
        d["system"] = system
        frames.append(d)
    tidy = pd.concat(frames, ignore_index=True)
    RESULTS_DIR.mkdir(parents=True, exist_ok=True)
    out = RESULTS_DIR / f"{name}.md"
    parts = [f"# {name}", "", "## Percentiles (ms)",
             harness.to_markdown(harness.percentile_table(tidy)), ""]
    if baseline and contender:
        parts += ["## Per-query",
                  harness.to_markdown(harness.per_query_table(tidy, baseline, contender)), ""]
    pivot = tidy.pivot_table(index="query", columns="system", values="ms", sort=False)
    parts += ["## Runtimes (ms) per system", harness.to_markdown(pivot.reset_index()), ""]
    out.write_text("\n".join(parts))
    return out
