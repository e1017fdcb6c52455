"""Table 9: DuckDB vs GRainDB on TPC-H-lite (the no-overhead sanity check).

Regenerates ``results/table9_tpch.md``.
"""
import pytest

from benchmarks._common import bench_system, write_table
from repro.bench import harness
from repro.bench.runners import make_runners
from repro.bench.workloads_tpch import specs
from repro.data.tpch import tpch_catalog

_STORE: dict = {}


@pytest.fixture(scope="module")
def tpch_cat(spark):
    harness.bench_session(spark)
    cat = tpch_catalog(spark, sf=harness.TPCH_SF, seed=21)
    yield cat
    cat.unpersist()


def test_table9_tpch_duckdb(benchmark, spark, tpch_cat):
    runner = make_runners(spark, tpch_cat, ["DuckDB"])["DuckDB"]
    bench_system(benchmark, specs(), runner, _STORE, "DuckDB")


def test_table9_tpch_graindb(benchmark, spark, tpch_cat):
    runner = make_runners(spark, tpch_cat, ["GRainDB"])["GRainDB"]
    bench_system(benchmark, specs(), runner, _STORE, "GRainDB")
    write_table(_STORE, "table9_tpch", baseline="DuckDB", contender="GRainDB")
