"""Design-decision baselines (§1, §3.2, §5).

Quantifies the two execution-model claims the paper makes against
"existing scale-out stream processors":

* cooperative tasklets vs an operator-per-thread preemptive scheduler;
* tuned concurrent G1 vs an untuned stop-the-world collector
  (the "p99 can easily reach seconds" failure mode [18]).
"""
from repro.core.fluid import FluidSpec
from repro.core.gc_model import STW_BASELINE
from repro.harness.report import table
from repro.harness.sweep import sweep


def specs() -> list[FluidSpec]:
    base = dict(query="q5", n_nodes=1, rate=12e6, size_ms=10_000, slide_ms=10,
                duration_s=120.0)
    return [
        FluidSpec(**base),  # Jet: cooperative + tuned G1
        FluidSpec(**base, scheduler="preemptive"),
        FluidSpec(**base, gc=STW_BASELINE),
        FluidSpec(**base, scheduler="preemptive", gc=STW_BASELINE),
    ]


def _label(r) -> str:
    sched = "cooperative" if r["scheduler"] == "cooperative" else "preemptive"
    gc = "G1-tuned" if r["gc_name"] == "g1-tuned" else "STW"
    return f"{sched} + {gc}"


def run(spark):
    pdf = sweep(spark, specs())
    rows = [
        {
            "execution model": _label(r),
            "p50": f"{r['p50']:.1f}",
            "p99": f"{r['p99']:.1f}",
            "p99.99": f"{r['p99_99']:.1f}",
        }
        for _, r in pdf.iterrows()
    ]
    md = table(
        "Baselines — Q5 at 1M ev/s/core: why tasklets + GC tuning matter (ms)",
        rows,
        ["execution model", "p50", "p99", "p99.99"],
    )
    return pdf, md


if __name__ == "__main__":
    from _common import run_main

    run_main(run, "baselines")
