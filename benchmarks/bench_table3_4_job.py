"""Tables 3, 4, 8: DuckDB vs GRainDB on the JOB-lite workload.

Table 3 = runtime percentiles over the 33 first-variant queries; Table 4/8 =
per-query runtimes + scan reduction. Regenerates ``results/table3_4_job.md``.
"""
import pytest

from benchmarks._common import bench_system, write_table
from repro.bench import harness
from repro.bench.runners import make_runners
from repro.bench.workloads_job import first_variants
from repro.data.imdb import imdb_catalog

_STORE: dict = {}


@pytest.fixture(scope="module")
def job_cat(spark):
    harness.bench_session(spark)
    cat = imdb_catalog(spark, scale=harness.JOB_SCALE, seed=11)
    yield cat
    cat.unpersist()


def test_table3_job_duckdb(benchmark, spark, job_cat):
    runner = make_runners(spark, job_cat, ["DuckDB"])["DuckDB"]
    bench_system(benchmark, first_variants(), runner, _STORE, "DuckDB")


def test_table3_job_graindb(benchmark, spark, job_cat):
    runner = make_runners(spark, job_cat, ["GRainDB"])["GRainDB"]
    bench_system(benchmark, first_variants(), runner, _STORE, "GRainDB")
    write_table(_STORE, "table3_4_job", baseline="DuckDB", contender="GRainDB")
