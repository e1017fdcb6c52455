"""Table 7: plan-spectrum study on JOB Q1a/b–Q6a/b — P*_Duck vs P*_opt.

One benchmark case per query (the measured callable enumerates and executes
all left-deep orders under both value-based and predefined joins).
Regenerates ``results/table7_spectrum.md``. ``REPRO_SPECTRUM_PLANS`` bounds
the number of enumerated orders per query (default 8).
"""
import os

import pandas as pd
import pytest

from benchmarks._common import RESULTS_DIR
from repro.bench import harness
from repro.bench.spectrum import table7
from repro.bench.workloads_job import spectrum_queries
from repro.data.imdb import imdb_catalog

_MAX_PLANS = int(os.environ.get("REPRO_SPECTRUM_PLANS", "8"))
_STORE: dict = {}
_QUERIES = spectrum_queries()


@pytest.fixture(scope="module")
def job_cat(spark):
    harness.bench_session(spark)
    cat = imdb_catalog(spark, scale=harness.JOB_SCALE, seed=11)
    yield cat
    cat.unpersist()


@pytest.mark.parametrize("qname", list(_QUERIES))
def test_table7_spectrum(benchmark, spark, job_cat, qname):
    def once():
        _, summary = table7(
            spark, job_cat, {qname: _QUERIES[qname]}, max_plans=_MAX_PLANS, runs=1
        )
        _STORE[qname] = summary

    benchmark.pedantic(once, rounds=1, iterations=1, warmup_rounds=0)
    if qname == list(_QUERIES)[-1]:
        RESULTS_DIR.mkdir(parents=True, exist_ok=True)
        df = pd.concat(list(_STORE.values()), ignore_index=True)
        (RESULTS_DIR / "table7_spectrum.md").write_text(
            "# table7_spectrum\n\n" + harness.to_markdown(df) + "\n"
        )
