"""Figure 10: max ingest throughput vs cluster size, Q5 with 500 ms slide.

Paper reads: 12 cores ingest ~23.4 M ev/s; 240 cores reach 468 M ev/s
(near-linear thanks to two-stage combiners bounding exchanged data by
the key-set size), while p99.99 latency never exceeds 17 ms.
"""
from repro.core.fluid import FluidSpec, max_throughput
from repro.harness.report import table
from repro.harness.sweep import sweep

NODES = [1, 5, 10, 15, 20]

#: cores -> paper's measured ingest (M ev/s), read off Fig 10
PAPER_MEPS = {12: 23.4, 60: 117.0, 120: 234.0, 180: 350.0, 240: 468.0}


def specs() -> list[FluidSpec]:
    out = []
    for n in NODES:
        base = FluidSpec(query="q5", n_nodes=n, size_ms=10_000, slide_ms=500,
                         duration_s=120.0)
        # simulate latency *at* the max sustained rate
        out.append(
            FluidSpec(query="q5", n_nodes=n, size_ms=10_000, slide_ms=500,
                      rate=max_throughput(base), duration_s=120.0)
        )
    return out


def run(spark):
    pdf = sweep(spark, specs()).sort_values("n_nodes").reset_index(drop=True)
    rows = []
    for _, r in pdf.iterrows():
        cores = int(r["n_nodes"]) * 12
        rows.append(
            {
                "cores": cores,
                "max M ev/s": f"{r['max_throughput'] / 1e6:.0f}",
                "per-core M ev/s": f"{r['max_throughput'] / cores / 1e6:.2f}",
                "p99.99 ms @max": f"{r['p99_99']:.1f}",
                "paper M ev/s": PAPER_MEPS.get(cores, "—"),
            }
        )
    md = table(
        "Fig 10 — Q5 500 ms slide: throughput scale-out (paper p99.99 <= 17 ms)",
        rows,
        ["cores", "max M ev/s", "per-core M ev/s", "p99.99 ms @max", "paper M ev/s"],
    )
    return pdf, md


if __name__ == "__main__":
    from _common import run_main

    run_main(run, "fig10")
