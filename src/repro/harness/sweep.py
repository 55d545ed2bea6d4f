"""Spark-driven parameter sweeps over fluid-model configurations.

Every figure of the paper is a sweep over ``FluidSpec`` rows. The sweep
itself runs *on Spark*: specs become a DataFrame, ``mapInPandas`` fans
the simulations out across executor cores (Arrow-encoded both ways),
and the collected result is one row per configuration with the latency
percentiles the paper plots. This keeps each figure harness a genuine
Catalyst job while the model stays deterministic per spec seed.
"""
from dataclasses import asdict

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from ..core.fluid import FluidSpec, max_throughput, simulate
from ..core.gc_model import G1_TUNED, STW_BASELINE

_GC_BY_NAME = {G1_TUNED.name: G1_TUNED, STW_BASELINE.name: STW_BASELINE}

_SPEC_COLS = [
    "query",
    "n_nodes",
    "cores_per_node",
    "rate",
    "size_ms",
    "slide_ms",
    "n_keys",
    "guarantee",
    "snapshot_interval_ms",
    "scheduler",
    "gc_name",
    "n_jobs",
    "duration_s",
    "seed",
]

RESULT_COLS = _SPEC_COLS + [
    "utilization",
    "capacity_per_core",
    "max_throughput",
    "p50",
    "p90",
    "p99",
    "p99_9",
    "p99_99",
]


def specs_to_pdf(specs: list[FluidSpec]) -> pd.DataFrame:
    """Encode specs as a flat frame (GC config by name)."""
    rows = []
    for s in specs:
        d = asdict(s)
        d["gc_name"] = s.gc.name
        del d["gc"]
        d["snapshot_interval_ms"] = (
            float(d["snapshot_interval_ms"]) if d["snapshot_interval_ms"] else 0.0
        )
        rows.append(d)
    return pd.DataFrame(rows)[_SPEC_COLS]


def _decode(row) -> FluidSpec:
    return FluidSpec(
        query=row["query"],
        n_nodes=int(row["n_nodes"]),
        cores_per_node=int(row["cores_per_node"]),
        rate=float(row["rate"]),
        size_ms=int(row["size_ms"]),
        slide_ms=int(row["slide_ms"]),
        n_keys=int(row["n_keys"]),
        guarantee=row["guarantee"],
        snapshot_interval_ms=float(row["snapshot_interval_ms"]) or None,
        scheduler=row["scheduler"],
        gc=_GC_BY_NAME[row["gc_name"]],
        n_jobs=int(row["n_jobs"]),
        duration_s=float(row["duration_s"]),
        seed=int(row["seed"]),
    )


def _run_partition(frames):
    for pdf in frames:
        out = []
        for _, row in pdf.iterrows():
            spec = _decode(row)
            res = simulate(spec)
            rec = dict(row)
            rec.update(
                utilization=res.utilization,
                capacity_per_core=res.capacity_per_core,
                max_throughput=max_throughput(spec),
                p50=res.percentile(50),
                p90=res.percentile(90),
                p99=res.percentile(99),
                p99_9=res.percentile(99.9),
                p99_99=res.percentile(99.99),
            )
            out.append(rec)
        yield pd.DataFrame(out)[RESULT_COLS]


def sweep(spark: SparkSession, specs: list[FluidSpec]) -> pd.DataFrame:
    """Run every spec as a Spark task; return one result row per spec,
    in the input order."""
    pdf = specs_to_pdf(specs)
    sdf: DataFrame = spark.createDataFrame(pdf).repartition(max(len(specs), 1))
    schema = (
        "query string, n_nodes long, cores_per_node long, rate double, "
        "size_ms long, slide_ms long, n_keys long, guarantee string, "
        "snapshot_interval_ms double, scheduler string, gc_name string, "
        "n_jobs long, duration_s double, seed long, utilization double, "
        "capacity_per_core double, max_throughput double, p50 double, "
        "p90 double, p99 double, p99_9 double, p99_99 double"
    )
    out = sdf.mapInPandas(_run_partition, schema=schema).toPandas()
    return (
        out.sort_values(["query", "n_nodes", "rate", "n_jobs", "seed"])
        .reset_index(drop=True)
    )
