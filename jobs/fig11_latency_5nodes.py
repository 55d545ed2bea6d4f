"""Figures 11: latency distribution for all queries on a 5-node cluster
(FT disabled, §7.5).

Paper reads: map/filter queries p99.99 at or below 1 ms; joins/windowed
queries 11-12 ms at p99.99 with >90% of events at <=2 ms.
"""
from repro.core.fluid import FluidSpec
from repro.harness.report import table
from repro.harness.sweep import sweep

QUERIES = ["q1", "q2", "q5", "q8", "q13"]
PAPER_P9999 = {"q1": "<=1", "q2": "<=1", "q5": "11-12", "q8": "11-12", "q13": "~2"}


def specs(n_nodes: int = 5) -> list[FluidSpec]:
    return [
        FluidSpec(query=q, n_nodes=n_nodes, rate=1e6, size_ms=10_000, slide_ms=10,
                  duration_s=240.0)
        for q in QUERIES
    ]


def run(spark, *, n_nodes: int = 5, fig: str = "11"):
    pdf = sweep(spark, specs(n_nodes))
    rows = [
        {
            "query": r["query"].upper(),
            "p50": f"{r['p50']:.2f}",
            "p90": f"{r['p90']:.2f}",
            "p99": f"{r['p99']:.2f}",
            "p99.99": f"{r['p99_99']:.2f}",
            "paper p99.99": PAPER_P9999[r["query"]],
        }
        for _, r in pdf.sort_values("query").iterrows()
    ]
    md = table(
        f"Fig {fig} — latency (ms), {n_nodes}-node cluster, 1M ev/s, FT off",
        rows,
        ["query", "p50", "p90", "p99", "p99.99", "paper p99.99"],
    )
    return pdf, md


if __name__ == "__main__":
    from _common import run_main

    run_main(run, "fig11")
