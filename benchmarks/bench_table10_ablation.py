"""Table 10: ablation on SNB-M — DuckDB / −JM−RSJ / −JM / full GRainDB.

Each optimization level is one benchmark case. Regenerates
``results/table10_ablation.md``.
"""
import pytest

from benchmarks._common import bench_system, write_table
from repro.bench import harness
from repro.bench.runners import make_runners
from repro.bench.workloads_snb import specs
from repro.data.snb import snb_catalog

_STORE: dict = {}
_LEVELS = ["DuckDB", "GRainDB-JM-RSJ", "GRainDB-JM", "GRainDB"]


@pytest.fixture(scope="module")
def snb_cat(spark):
    harness.bench_session(spark)
    cat = snb_catalog(spark, scale=harness.SNB_SCALE, seed=7)
    yield cat
    cat.unpersist()


@pytest.mark.parametrize("level", _LEVELS)
def test_table10_ablation(benchmark, spark, snb_cat, level):
    runner = make_runners(spark, snb_cat, [level])[level]
    bench_system(benchmark, specs(), runner, _STORE, level)
    if level == _LEVELS[-1]:
        write_table(_STORE, "table10_ablation", baseline="DuckDB",
                    contender="GRainDB")
