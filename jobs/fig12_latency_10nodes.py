"""Figure 12: latency distribution on a 10-node cluster (§7.5).

Same shape as Fig 11 with slightly heavier distributed-exchange tails.
"""
from fig11_latency_5nodes import run as _run


def run(spark):
    return _run(spark, n_nodes=10, fig="12")


if __name__ == "__main__":
    from _common import run_main

    run_main(run, "fig12")
