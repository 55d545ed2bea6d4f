"""Property-based tests: the two-stage windowing pipeline equals a
brute-force sliding-window count on arbitrary inputs (hypothesis)."""
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.items import WM_MAX, Event
from repro.core.processors import PaneAccumulator, WindowCombiner, WindowTop

EVENTS = st.lists(
    st.tuples(st.integers(0, 4), st.integers(0, 199)),  # (key, ts)
    min_size=0,
    max_size=60,
)
GEOM = st.sampled_from([(40, 10), (40, 20), (20, 20), (60, 10)])


def brute_force(events, size, slide):
    """Reference: per (window, key) counts over epoch-aligned windows."""
    out = {}
    for key, ts in events:
        last = (ts // slide) * slide
        s = last
        while s > ts - size:
            if s >= 0 or True:  # windows may start negative
                out[(s, key)] = out.get((s, key), 0) + 1
            s -= slide
    return out


def run_two_stage(events, size, slide, *, n_partials=1, wm_steps=None):
    """Drive stage1 instances -> one combiner; return emitted counts."""
    accs = [PaneAccumulator(lambda p: p["k"], slide) for _ in range(n_partials)]
    comb = WindowCombiner(size, slide)
    for i, (key, ts) in enumerate(events):
        accs[i % n_partials].process(Event({"k": key}, ts), 0)
    results = {}
    for wm in (wm_steps or []) + [WM_MAX]:
        for acc in accs:
            for ev in acc.on_watermark(wm):
                comb.process(ev, 0)
        for ev in comb.on_watermark(wm):
            r = ev.payload
            key = (r.window_start, r.key)
            assert key not in results, "window result emitted twice"
            results[key] = r.value
    return results


@settings(max_examples=40, deadline=None)
@given(EVENTS, GEOM)
def test_two_stage_equals_brute_force(events, geom):
    size, slide = geom
    assert run_two_stage(events, size, slide) == brute_force(events, size, slide)


@settings(max_examples=25, deadline=None)
@given(EVENTS, GEOM, st.integers(2, 4))
def test_partials_merge_equals_single_instance(events, geom, n_partials):
    size, slide = geom
    assert run_two_stage(events, size, slide, n_partials=n_partials) == brute_force(
        events, size, slide
    )


@settings(max_examples=25, deadline=None)
@given(EVENTS, GEOM)
def test_incremental_watermarks_equal_one_shot(events, geom):
    size, slide = geom
    steps = list(range(0, 260, 30))
    assert run_two_stage(events, size, slide, wm_steps=steps) == brute_force(
        events, size, slide
    )


@settings(max_examples=25, deadline=None)
@given(EVENTS)
def test_window_top_equals_brute_force_max(events):
    size, slide = 40, 20
    counts = brute_force(events, size, slide)
    comb_out = run_two_stage(events, size, slide)
    top = WindowTop(size)
    from repro.core.processors import WindowResult

    for (ws, key), v in comb_out.items():
        top.process(Event(WindowResult(ws, ws + size, key, v, 0.0), ws + size - 1), 0)
    got = {}
    for ev in top.on_watermark(WM_MAX):
        got.setdefault(ev.payload["window_start"], set()).add(
            (ev.payload["auction"], ev.payload["n_bids"])
        )
    for ws in {w for (w, _k) in counts}:
        per_key = {k: v for (w, k), v in counts.items() if w == ws}
        best = max(per_key.values())
        want = {(k, best) for k, v in per_key.items() if v == best}
        assert got[ws] == want


@settings(max_examples=30, deadline=None)
@given(st.lists(st.integers(0, 100), max_size=50), st.integers(1, 8))
def test_spsc_queue_preserves_order_and_capacity(items, cap):
    from repro.core.queues import SPSCQueue

    q = SPSCQueue(cap)
    accepted = [x for x in items if q.offer(x)]
    assert len(accepted) == min(len(items), cap)
    assert q.drain(100) == accepted
