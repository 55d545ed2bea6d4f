"""Fault tolerance & processing guarantees (§4.4–§4.6).

The decisive property: with exactly-once guarantee + transactional
sink, a run with an injected node crash commits *exactly* the rows of a
failure-free run — no loss, no duplicates — because the job restores
from the last completed IMDG snapshot, replays the replayable sources
from their snapshotted offsets, and deduplicates sink re-commits.
"""
from collections import Counter

import pytest

from repro.core.engine import JetEngine, SimConfig
from repro.nexmark import generator as gen
from repro.nexmark import queries_jet as qj


def multiset(dicts: list[dict], cols: list[str]) -> Counter:
    return Counter(
        tuple(round(d[c], 4) if isinstance(d[c], float) else d[c] for c in cols)
        for d in dicts
    )


def mk_engine(pipeline, sources, *, guarantee, snapshot_ms, n_nodes=2, seed=1):
    return JetEngine(
        pipeline.compile(),
        sources,
        n_nodes=n_nodes,
        cfg=SimConfig(
            threads_per_node=2,
            slice_ms=0.5,
            guarantee=guarantee,
            snapshot_interval_ms=snapshot_ms,
            seed=seed,
        ),
    )


@pytest.fixture(scope="module")
def data():
    return gen.generate(rate=3_000, duration_s=1.2, n_keys=150, seed=31)


@pytest.fixture(scope="module")
def q5_clean(data):
    """Failure-free exactly-once Q5 reference run."""
    eng = mk_engine(
        qj.q5_pipeline(size_ms=1_000, slide_ms=250),
        {"bids": qj.bid_events(data)},
        guarantee="exactly-once",
        snapshot_ms=250,
    )
    eng.run()
    return eng


Q5_COLS = ["window_start", "auction", "n_bids"]


def test_snapshots_complete_under_normal_operation(q5_clean):
    assert q5_clean.metrics.snapshots_completed >= 2
    assert q5_clean.metrics.recoveries == 0


@pytest.mark.parametrize("fail_ms,victim", [(600, 0), (600, 1), (900, 1)])
def test_exactly_once_q5_crash_equals_clean_run(data, q5_clean, fail_ms, victim):
    eng = mk_engine(
        qj.q5_pipeline(size_ms=1_000, slide_ms=250),
        {"bids": qj.bid_events(data)},
        guarantee="exactly-once",
        snapshot_ms=250,
    )
    eng.run(fail_at=[(fail_ms, victim)])
    assert eng.metrics.recoveries == 1
    assert multiset(eng.results(), Q5_COLS) == multiset(q5_clean.results(), Q5_COLS)


def test_exactly_once_q1_crash_no_loss_no_dup(data):
    clean = mk_engine(
        qj.q1_pipeline(),
        {"bids": qj.bid_events(data)},
        guarantee="exactly-once",
        snapshot_ms=200,
    )
    clean.run()
    crashed = mk_engine(
        qj.q1_pipeline(),
        {"bids": qj.bid_events(data)},
        guarantee="exactly-once",
        snapshot_ms=200,
    )
    crashed.run(fail_at=[(700, 0)])
    cols = ["auction", "bidder", "price_eur", "ts_ms"]
    assert multiset(crashed.results(), cols) == multiset(clean.results(), cols)
    assert len(crashed.results()) == len(data.bids)


def test_exactly_once_q8_crash_equals_clean_run(data):
    sources = {
        "persons": qj.person_events(data),
        "auctions": qj.auction_events(data),
    }
    clean = mk_engine(
        qj.q8_pipeline(size_ms=400), dict(sources), guarantee="exactly-once", snapshot_ms=250
    )
    clean.run()
    crashed = mk_engine(
        qj.q8_pipeline(size_ms=400), dict(sources), guarantee="exactly-once", snapshot_ms=250
    )
    crashed.run(fail_at=[(650, 1)])
    cols = ["id", "name", "window_start"]
    assert multiset(crashed.results(), cols) == multiset(clean.results(), cols)


def test_crash_before_first_snapshot_cold_restart(data):
    eng = mk_engine(
        qj.q1_pipeline(),
        {"bids": qj.bid_events(data)},
        guarantee="exactly-once",
        snapshot_ms=10_000,  # first snapshot far in the future
    )
    eng.run(fail_at=[(300, 0)])
    assert eng.last_complete_sid is None or eng.metrics.snapshots_completed == 0
    assert len(eng.results()) == len(data.bids)


def test_at_least_once_crash_superset_with_duplicates_allowed(data):
    clean = mk_engine(
        qj.q1_pipeline(),
        {"bids": qj.bid_events(data)},
        guarantee="at-least-once",
        snapshot_ms=200,
    )
    clean.run()
    crashed = mk_engine(
        qj.q1_pipeline(),
        {"bids": qj.bid_events(data)},
        guarantee="at-least-once",
        snapshot_ms=200,
    )
    crashed.run(fail_at=[(700, 0)])
    cols = ["auction", "bidder", "price_eur", "ts_ms"]
    got, want = multiset(crashed.results(), cols), multiset(clean.results(), cols)
    # every clean row is present at least as often; duplicates permitted
    assert all(got[k] >= n for k, n in want.items())
    assert len(crashed.results()) >= len(data.bids)


def test_at_least_once_clean_run_is_exact(data):
    eng = mk_engine(
        qj.q2_pipeline(),
        {"bids": qj.bid_events(data)},
        guarantee="at-least-once",
        snapshot_ms=200,
    )
    eng.run()
    expect = (data.bids["auction"] % 123 == 0).sum()
    assert len(eng.results()) == expect


def test_double_crash_still_exactly_once(data):
    clean = mk_engine(
        qj.q5_pipeline(size_ms=1_000, slide_ms=500),
        {"bids": qj.bid_events(data)},
        guarantee="exactly-once",
        snapshot_ms=250,
    )
    clean.run()
    crashed = mk_engine(
        qj.q5_pipeline(size_ms=1_000, slide_ms=500),
        {"bids": qj.bid_events(data)},
        guarantee="exactly-once",
        snapshot_ms=250,
    )
    crashed.run(fail_at=[(500, 0), (900, 1)])
    assert crashed.metrics.recoveries == 2
    assert multiset(crashed.results(), Q5_COLS) == multiset(clean.results(), Q5_COLS)


def test_snapshot_state_survives_in_imdg_replicas(q5_clean):
    # the snapshot IMaps are ordinary replicated IMaps: each partition's
    # fragments must exist on exactly backup_count+1 member nodes
    sid = q5_clean.last_complete_sid
    assert sid is not None
    name = f"__snap.{sid}.__inst"
    cluster = q5_clean.cluster
    holders = 0
    for node in cluster.nodes.values():
        if any(frag for frag in node.storage.get(name, {}).values()):
            holders += 1
    assert holders >= 2


def test_exactly_once_blocks_aligned_channels():
    # direct check of the alignment rule on a 2-input tasklet
    from repro.core.items import Barrier, Event
    from repro.core.processors import Processor
    from repro.core.queues import SPSCQueue
    from repro.core.tasklet import InboundChannel, Tasklet

    class Collect(Processor):
        def __init__(self):
            self.seen = []

        def process(self, ev, ordinal):
            self.seen.append(ev.payload)
            return []

    qa, qb = SPSCQueue(16), SPSCQueue(16)
    proc = Collect()
    t = Tasklet("t", proc, [InboundChannel(qa), InboundChannel(qb, ordinal=1)], [],
                exactly_once=True)
    qa.offer(Event("a1", 0))
    qa.offer(Barrier(1))
    qa.offer(Event("a2", 0))  # post-barrier: must NOT be processed yet
    qb.offer(Event("b1", 0))
    t.run(0.0)
    t.run(0.0)
    assert "a1" in proc.seen and "b1" in proc.seen
    assert "a2" not in proc.seen  # aligned channel blocked
    qb.offer(Barrier(1))
    t.run(0.0)
    t.run(0.0)
    assert "a2" in proc.seen  # alignment complete, channel released


def test_at_least_once_does_not_block_channels():
    from repro.core.items import Barrier, Event
    from repro.core.processors import Processor
    from repro.core.queues import SPSCQueue
    from repro.core.tasklet import InboundChannel, Tasklet

    class Collect(Processor):
        def __init__(self):
            self.seen = []

        def process(self, ev, ordinal):
            self.seen.append(ev.payload)
            return []

    qa, qb = SPSCQueue(16), SPSCQueue(16)
    proc = Collect()
    t = Tasklet("t", proc, [InboundChannel(qa), InboundChannel(qb, ordinal=1)], [],
                exactly_once=False)
    qa.offer(Event("a1", 0))
    qa.offer(Barrier(1))
    qa.offer(Event("a2", 0))
    t.run(0.0)
    t.run(0.0)
    assert "a2" in proc.seen  # no alignment blocking under at-least-once
