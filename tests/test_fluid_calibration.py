"""Fluid-model calibration against the paper's headline numbers.

Bounds are deliberately loose (we reproduce *shape*, not testbed
absolutes — DESIGN.md §1), but every directional claim in the paper's
evaluation is pinned down as an assertion here.
"""
import numpy as np
import pytest

from repro.core.fluid import (
    FluidSpec,
    capacity_per_core,
    max_throughput,
    simulate,
    utilization,
)
from repro.core.gc_model import STW_BASELINE


def q5_single_node(rate_per_core: float, **kw) -> FluidSpec:
    return FluidSpec(query="q5", n_nodes=1, rate=rate_per_core * 12, slide_ms=10, **kw)


# -- §4.6 / Fig 7: per-core capacity ------------------------------------


def test_capacity_per_core_about_2m_for_windowed_aggregate():
    cap = capacity_per_core(q5_single_node(0))
    assert 1.7e6 < cap < 2.4e6  # "2M events per second per CPU core"


def test_capacity_higher_for_stateless_queries():
    assert capacity_per_core(FluidSpec(query="q1")) > capacity_per_core(
        FluidSpec(query="q5", slide_ms=10)
    )


def test_fine_slide_costs_capacity():
    # Fig 7 (10 ms slide) saturates earlier than Fig 10 (500 ms slide)
    assert capacity_per_core(FluidSpec(query="q5", slide_ms=10)) < capacity_per_core(
        FluidSpec(query="q5", slide_ms=500)
    )


# -- Fig 7: throughput vs latency ---------------------------------------


def test_fig7_low_rate_p9999_under_20ms():
    r = simulate(q5_single_node(0.5e6, duration_s=120))
    assert r.percentile(99.99) < 20  # paper: ~13 ms


def test_fig7_saturation_p9999_50_to_200ms():
    r = simulate(q5_single_node(2.0e6, duration_s=120))
    assert 50 < r.percentile(99.99) < 200  # paper: ~98 ms


def test_fig7_latency_monotone_in_throughput():
    p = [
        simulate(q5_single_node(rc, duration_s=120)).percentile(99.99)
        for rc in (0.5e6, 1.5e6, 2.0e6)
    ]
    assert p[0] < p[1] < p[2]


def test_fig7_crossover_above_1_75m_per_core():
    # "more than 1.75M events per second can put a burden on Jet's
    # processors, increasing its latency quite considerably"
    below = simulate(q5_single_node(1.5e6, duration_s=120)).percentile(99.99)
    above = simulate(q5_single_node(2.0e6, duration_s=120)).percentile(99.99)
    assert above > 2.5 * below


# -- Figs 8/9: fixed 1M ev/s, scale-out ---------------------------------


@pytest.mark.parametrize("n_nodes", [1, 5, 10, 20])
def test_fig8_p9999_never_exceeds_25ms(n_nodes):
    r = simulate(FluidSpec(query="q5", n_nodes=n_nodes, rate=1e6, slide_ms=10))
    assert r.percentile(99.99) < 25  # paper: never exceeds 16 ms


def test_fig9_p999_under_10ms_all_queries():
    for q in ("q1", "q2", "q5", "q8", "q13"):
        r = simulate(FluidSpec(query=q, n_nodes=20, rate=1e6, slide_ms=10))
        assert r.percentile(99.9) <= 12, q  # paper: worst case 10 ms


def test_fig9_simple_queries_much_lower_than_windowed():
    q1 = simulate(FluidSpec(query="q1", n_nodes=20, rate=1e6))
    q5 = simulate(FluidSpec(query="q5", n_nodes=20, rate=1e6, slide_ms=10))
    assert q1.percentile(99) < q5.percentile(99)
    assert q1.percentile(50) < 1.0


# -- Figs 11/12: 5- and 10-node latency ---------------------------------


@pytest.mark.parametrize("n_nodes", [5, 10])
def test_fig11_12_stateless_p9999_about_1ms(n_nodes):
    for q in ("q1", "q2"):
        r = simulate(FluidSpec(query=q, n_nodes=n_nodes, rate=1e6))
        assert r.percentile(99.99) < 2.0, q  # paper: at or below 1 ms


@pytest.mark.parametrize("n_nodes", [5, 10])
def test_fig11_12_windowed_p9999_order_10ms(n_nodes):
    for q in ("q5", "q8"):
        r = simulate(FluidSpec(query=q, n_nodes=n_nodes, rate=1e6, slide_ms=10))
        assert 5 < r.percentile(99.99) < 20, q  # paper: 11-12 ms


def test_fig11_windowed_90pct_under_2ms_effect():
    # "more than 90% of the events exhibit a latency of 2ms or less for
    # joins" — our trigger path floor is similar: p50 well under p99.99
    r = simulate(FluidSpec(query="q8", n_nodes=5, rate=1e6, slide_ms=10))
    assert r.percentile(50) < 5
    assert r.percentile(50) < r.percentile(99.99) / 2


# -- Fig 10: throughput scale-out ---------------------------------------


def test_fig10_single_vm_over_20m():
    t = max_throughput(FluidSpec(query="q5", n_nodes=1, slide_ms=500))
    assert 18e6 < t < 30e6  # paper: ~23.4M on 12 cores


def test_fig10_240_cores_reaches_hundreds_of_millions():
    t = max_throughput(FluidSpec(query="q5", n_nodes=20, slide_ms=500))
    assert 400e6 < t < 560e6  # paper: 468M ev/s


def test_fig10_latency_stays_low_at_max_ingest():
    # "the 99.99th latency never exceeded 17ms" while ingesting at max
    for n in (1, 20):
        base = FluidSpec(query="q5", n_nodes=n, size_ms=10_000, slide_ms=500,
                         duration_s=240)
        s = FluidSpec(query="q5", n_nodes=n, size_ms=10_000, slide_ms=500,
                      rate=max_throughput(base), duration_s=240)
        assert simulate(s).percentile(99.99) < 25


def test_fig10_scaling_near_linear():
    t1 = max_throughput(FluidSpec(query="q5", n_nodes=1, slide_ms=500))
    t20 = max_throughput(FluidSpec(query="q5", n_nodes=20, slide_ms=500))
    assert t20 / t1 > 16  # ≥80% scaling efficiency at 20 nodes


# -- Fig 13: fault-tolerance latency ------------------------------------


def _ft_run():
    return simulate(
        FluidSpec(
            query="q5",
            n_nodes=5,
            rate=1e6,
            slide_ms=10,
            guarantee="exactly-once",
            snapshot_interval_ms=1000,
            duration_s=120,
        )
    )


def test_fig13_p9999_order_350ms():
    r = _ft_run()
    assert 250 < r.percentile(99.99) < 450  # paper: ~350 ms


def test_fig13_sawtooth_shape():
    r = _ft_run()
    # low for ~70% of samples, ~200 ms at p90, smoothing toward p99.99
    assert r.percentile(70) < 60
    assert 120 < r.percentile(90) < 280  # paper: ~200 ms
    assert r.percentile(99) < r.percentile(99.99) * 1.05


def test_ft_overhead_vs_no_ft():
    ft = _ft_run()
    no_ft = simulate(FluidSpec(query="q5", n_nodes=5, rate=1e6, slide_ms=10, duration_s=120))
    assert ft.percentile(99.99) > 10 * no_ft.percentile(99.99)


# -- §7.7: multi-tenancy -------------------------------------------------


def test_multitenancy_100_jobs_p9999_order_200ms():
    r = simulate(FluidSpec(query="q5", n_nodes=1, rate=1e6, slide_ms=10, n_jobs=100))
    assert 120 < r.percentile(99.99) < 350  # paper: ~200 ms


def test_multitenancy_scales_with_job_count():
    p = [
        simulate(
            FluidSpec(query="q5", n_nodes=1, rate=1e6, slide_ms=10, n_jobs=j)
        ).percentile(99.99)
        for j in (1, 10, 100)
    ]
    assert p[0] < p[1] < p[2]


# -- baselines: why Jet's design choices matter -------------------------


def test_preemptive_scheduler_baseline_much_worse():
    coop = simulate(q5_single_node(1.0e6, duration_s=120))
    preempt = simulate(q5_single_node(1.0e6, scheduler="preemptive", duration_s=120))
    assert preempt.percentile(99.99) > 3 * coop.percentile(99.99)


def test_stw_gc_baseline_reaches_hundreds_of_ms():
    # "latency on the 99th percentile can easily reach seconds" [18] —
    # with an untuned collector the tail explodes
    r = simulate(q5_single_node(1.5e6, gc=STW_BASELINE, duration_s=120))
    assert r.percentile(99.99) > 100


def test_deterministic_in_seed():
    a = simulate(q5_single_node(1.0e6, seed=3))
    b = simulate(q5_single_node(1.0e6, seed=3))
    assert np.array_equal(a.latencies_ms, b.latencies_ms)


def test_utilization_definition():
    s = q5_single_node(1.0e6)
    assert utilization(s) == pytest.approx(
        (s.rate / 12) / capacity_per_core(s)
    )
