"""Plan-spectrum and MICRO sweep drivers at unit scale (Table 7 / Figure 5)."""
import pytest

from repro.bench.micro import run_micro
from repro.bench.spectrum import spectrum_for_query, table7
from repro.bench.workloads_job import specs as job_specs


def test_spectrum_for_query_runs_all_orders(spark, imdb_cat):
    spec = job_specs()["Q3a"]  # 3 tables -> small order space
    df = spectrum_for_query(spark, imdb_cat, spec, max_plans=4, runs=1)
    assert (df["order"] == "(default)").sum() == 1
    assert len(df) == 5
    assert (df[df["order"] != "(default)"]["duck_ms"] > 0).all()


def test_table7_summary_fields(spark, imdb_cat):
    _, summary = table7(
        spark, imdb_cat, {"Q2a": job_specs()["Q2a"]}, max_plans=3, runs=1
    )
    row = summary.iloc[0]
    assert row["P*_opt_ms"] <= row["P*_Duck_ms"]
    assert row["headroom"] >= 1.0
    assert row["n_plans"] == 3


def test_micro_sweep_shapes(spark, snb_cat):
    df = run_micro(
        spark, snb_cat, systems=("DuckDB", "GRainDB"),
        selectivities=(0.01, 1.0), runs=1,
    )
    assert set(df["sweep"]) == {"MICRO-P", "MICRO-K"}
    assert len(df) == 2 * 2 * 2


def test_micro_p_sip_prunes_knows(spark, snb_cat):
    """MICRO-P at low Person selectivity: GRainDB scans fewer knows tuples."""
    df = run_micro(
        spark, snb_cat, systems=("DuckDB", "GRainDB"),
        selectivities=(0.01,), runs=1,
    )
    p = df[(df.sweep == "MICRO-P") & (df.selectivity == 0.01)]
    duck = int(p[p.system == "DuckDB"]["scanned"].iloc[0])
    grain = int(p[p.system == "GRainDB"]["scanned"].iloc[0])
    assert grain < duck
