"""Harness (Spark-driven sweep) and per-figure job tests."""
import os
import sys

import pytest

from repro.core.fluid import FluidSpec, simulate
from repro.harness.report import df_rows, fmt_meps, fmt_ms, table
from repro.harness.sweep import RESULT_COLS, specs_to_pdf, sweep

sys.path.insert(0, os.path.join(os.path.dirname(__file__), "..", "jobs"))


# -- sweep --------------------------------------------------------------


def test_specs_roundtrip_encoding():
    specs = [FluidSpec(query="q1"), FluidSpec(query="q5", guarantee="exactly-once",
                                              snapshot_interval_ms=500)]
    pdf = specs_to_pdf(specs)
    assert list(pdf["query"]) == ["q1", "q5"]
    assert pdf["snapshot_interval_ms"].tolist() == [0.0, 500.0]
    assert pdf["gc_name"].tolist() == ["g1-tuned", "g1-tuned"]


def test_sweep_runs_on_spark_and_matches_local(spark):
    specs = [
        FluidSpec(query="q5", n_nodes=1, rate=6e6, slide_ms=10, duration_s=20, seed=5),
        FluidSpec(query="q1", n_nodes=2, rate=1e6, duration_s=20, seed=5),
    ]
    pdf = sweep(spark, specs)
    assert list(pdf.columns) == RESULT_COLS
    assert len(pdf) == 2
    # the Spark-executed simulation must equal a local run (determinism)
    local = simulate(specs[0])
    row = pdf[pdf["query"] == "q5"].iloc[0]
    assert row["p99_99"] == pytest.approx(local.percentile(99.99))
    assert row["utilization"] == pytest.approx(local.utilization)


# -- report -------------------------------------------------------------


def test_table_renders_markdown():
    md = table("T", [{"a": 1, "b": 2}], ["a", "b"])
    assert "### T" in md and "| a | b |" in md and "| 1 | 2 |" in md


def test_formatters():
    assert fmt_ms(12.34) == "12.3 ms"
    assert fmt_ms(2000) == "2.00 s"
    assert fmt_meps(23.4e6) == "23.4M ev/s"


def test_df_rows_projection():
    import pandas as pd

    pdf = pd.DataFrame({"x": [1, 2], "y": [3, 4]})
    assert df_rows(pdf, {"col": "x"}) == [{"col": 1}, {"col": 2}]


# -- figure jobs (each returns a result frame + markdown table) ----------


@pytest.mark.parametrize(
    "mod_name,n_rows",
    [
        ("fig07_throughput_vs_latency", 6),
        ("fig08_latency_scaleout", 20),
        ("fig09_latency_distribution", 5),
        ("fig10_throughput_scaleout", 5),
        ("fig11_latency_5nodes", 5),
        ("fig12_latency_10nodes", 5),
        ("fig13_fault_tolerance", 2),
        ("fig14_multitenancy", 4),
        ("baseline_schedulers", 4),
    ],
)
def test_job_produces_table(spark, mod_name, n_rows):
    mod = __import__(mod_name)
    pdf, md = mod.run(spark)
    assert len(pdf) == n_rows
    assert md.startswith("###") and md.count("|") > 10


def test_fig07_shape_monotone(spark):
    mod = __import__("fig07_throughput_vs_latency")
    pdf, _ = mod.run(spark)
    p = pdf.sort_values("rate")["p99_99"].tolist()
    assert p[0] < p[-1]
    assert p[-1] > 50  # saturation tail


def test_fig10_shape_linear(spark):
    mod = __import__("fig10_throughput_scaleout")
    pdf, _ = mod.run(spark)
    t = pdf.sort_values("n_nodes")["max_throughput"].tolist()
    assert t[-1] / t[0] > 16


def test_fig13_ft_much_slower_than_no_ft(spark):
    mod = __import__("fig13_fault_tolerance")
    pdf, _ = mod.run(spark)
    ft = pdf[pdf["guarantee"] == "exactly-once"]["p99_99"].iloc[0]
    no = pdf[pdf["guarantee"] != "exactly-once"]["p99_99"].iloc[0]
    assert ft > 10 * no


def test_exact_engine_validation_job(spark):
    mod = __import__("exact_engine_validation")
    pdf, md = mod.run(spark)
    assert bool(pdf["matches oracle"].all())
    assert "exactly-once" in md
