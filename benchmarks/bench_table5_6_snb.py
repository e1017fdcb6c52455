"""Tables 5, 6: DuckDB vs GRainDB vs GraphflowDB(-style INLJ) on SNB-M.

Table 5 = percentiles over the 25 queries; Table 6 = per-query runtimes.
Regenerates ``results/table5_6_snb.md``.
"""
import pytest

from benchmarks._common import bench_system, write_table
from repro.bench import harness
from repro.bench.runners import make_runners
from repro.bench.workloads_snb import specs
from repro.data.snb import snb_catalog

_STORE: dict = {}


@pytest.fixture(scope="module")
def snb_cat(spark):
    harness.bench_session(spark)
    cat = snb_catalog(spark, scale=harness.SNB_SCALE, seed=7)
    yield cat
    cat.unpersist()


def test_table5_snb_duckdb(benchmark, spark, snb_cat):
    runner = make_runners(spark, snb_cat, ["DuckDB"])["DuckDB"]
    bench_system(benchmark, specs(), runner, _STORE, "DuckDB")


def test_table5_snb_graindb(benchmark, spark, snb_cat):
    runner = make_runners(spark, snb_cat, ["GRainDB"])["GRainDB"]
    bench_system(benchmark, specs(), runner, _STORE, "GRainDB")


def test_table5_snb_graphflow(benchmark, spark, snb_cat):
    runner = make_runners(spark, snb_cat, ["GraphflowDB"])["GraphflowDB"]
    bench_system(benchmark, specs(), runner, _STORE, "GraphflowDB")
    write_table(_STORE, "table5_6_snb", baseline="DuckDB", contender="GRainDB")
