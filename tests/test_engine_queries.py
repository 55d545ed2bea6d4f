"""Exact-mode engine vs DuckDB: the engine computes real query results.

Spark↔DuckDB equivalence is covered in ``test_queries_batch``; these
tests close the triangle by asserting engine↔DuckDB equality on the
same generated input, across cluster shapes and out-of-orderness.
"""
import duckdb
import pytest

from repro.core.engine import JetEngine, SimConfig
from repro.nexmark import generator as gen
from repro.nexmark import queries_jet as qj
from repro.nexmark.queries_batch import Q1_SQL, Q2_SQL, q5_sql, q8_sql, q13_sql


def duck(sql: str, **tables) -> set:
    con = duckdb.connect()
    try:
        for name, t in tables.items():
            con.register(name, t)
        rows = con.execute(sql).fetchall()
    finally:
        con.close()
    return {tuple(round(c, 4) if isinstance(c, float) else c for c in r) for r in rows}


def rows_set(dicts: list[dict], cols: list[str]) -> set:
    return {
        tuple(
            round(d[c], 4) if isinstance(d[c], float) else d[c] for c in cols
        )
        for d in dicts
    }


@pytest.fixture(scope="module")
def data():
    return gen.generate(rate=4_000, duration_s=1.0, n_keys=300, seed=77)


CFG = dict(threads_per_node=2, slice_ms=0.5)


@pytest.mark.parametrize("n_nodes", [1, 2, 3])
def test_q1_engine_matches_duckdb(data, n_nodes):
    eng = JetEngine(
        qj.q1_pipeline().compile(),
        {"bids": qj.bid_events(data)},
        n_nodes=n_nodes,
        cfg=SimConfig(**CFG),
    )
    eng.run()
    got = rows_set(eng.results(), ["auction", "bidder", "price_eur", "ts_ms"])
    want = duck(Q1_SQL, bids=data.bids)
    assert got == want


def test_q1_engine_preserves_multiplicity(data):
    eng = JetEngine(
        qj.q1_pipeline().compile(), {"bids": qj.bid_events(data)}, n_nodes=2,
        cfg=SimConfig(**CFG),
    )
    eng.run()
    assert len(eng.results()) == len(data.bids)


@pytest.mark.parametrize("n_nodes", [1, 2])
def test_q2_engine_matches_duckdb(data, n_nodes):
    eng = JetEngine(
        qj.q2_pipeline().compile(), {"bids": qj.bid_events(data)}, n_nodes=n_nodes,
        cfg=SimConfig(**CFG),
    )
    eng.run()
    got = rows_set(eng.results(), ["auction", "price"])
    assert got == duck(Q2_SQL, bids=data.bids)


@pytest.mark.parametrize("size_ms,slide_ms", [(2_000, 500), (1_000, 1_000)])
def test_q5_engine_matches_duckdb(data, size_ms, slide_ms):
    eng = JetEngine(
        qj.q5_pipeline(size_ms=size_ms, slide_ms=slide_ms).compile(),
        {"bids": qj.bid_events(data)},
        n_nodes=2,
        cfg=SimConfig(**CFG),
    )
    eng.run()
    got = rows_set(eng.results(), ["window_start", "auction", "n_bids"])
    want = duck(q5_sql(size_ms=size_ms, slide_ms=slide_ms), bids=data.bids)
    assert got == want


def test_q5_engine_with_out_of_order_input():
    d = gen.generate(rate=4_000, duration_s=1.0, n_keys=200, seed=5, ooo_max_delay_ms=150)
    eng = JetEngine(
        qj.q5_pipeline(size_ms=1_000, slide_ms=250, ooo_lag_ms=150).compile(),
        {"bids": qj.bid_events(d)},
        n_nodes=2,
        cfg=SimConfig(**CFG),
    )
    eng.run()
    got = rows_set(eng.results(), ["window_start", "auction", "n_bids"])
    want = duck(q5_sql(size_ms=1_000, slide_ms=250), bids=d.bids)
    assert got == want


@pytest.mark.parametrize("n_nodes", [1, 3])
def test_q8_engine_matches_duckdb(data, n_nodes):
    eng = JetEngine(
        qj.q8_pipeline(size_ms=500).compile(),
        {"persons": qj.person_events(data), "auctions": qj.auction_events(data)},
        n_nodes=n_nodes,
        cfg=SimConfig(**CFG),
    )
    eng.run()
    got = rows_set(eng.results(), ["id", "name", "window_start"])
    want = duck(q8_sql(size_ms=500), persons=data.persons, auctions=data.auctions)
    assert got == want


def test_q13_engine_matches_duckdb(data):
    side_size = 64
    t0 = int(data.bids["arrival_ms"].min())
    eng = JetEngine(
        qj.q13_pipeline(side_size=side_size).compile(),
        {"bids": qj.bid_events(data), "side": qj.side_events(side_size, t0)},
        n_nodes=2,
        cfg=SimConfig(**CFG),
    )
    eng.run()
    got = rows_set(eng.results(), ["auction", "bidder", "price", "ts_ms", "value"])
    want = duck(
        q13_sql(side_size=side_size), bids=data.bids, side=gen.side_input(side_size)
    )
    assert got == want


def test_engine_backpressure_tiny_queues_no_loss(data):
    eng = JetEngine(
        qj.q1_pipeline().compile(),
        {"bids": qj.bid_events(data)},
        n_nodes=2,
        cfg=SimConfig(threads_per_node=2, slice_ms=0.5, queue_capacity=8, inbox_limit=4),
    )
    eng.run()
    assert len(eng.results()) == len(data.bids)


def test_engine_records_trigger_latencies(data):
    eng = JetEngine(
        qj.q5_pipeline(size_ms=1_000, slide_ms=250).compile(),
        {"bids": qj.bid_events(data)},
        n_nodes=1,
        cfg=SimConfig(**CFG),
    )
    m = eng.run()
    assert m.trigger_latencies, "window triggers must record latency samples"
    lats = [l for _, l in m.trigger_latencies]
    assert all(l >= 0 for l in lats)


def test_engine_records_event_latencies(data):
    eng = JetEngine(
        qj.q1_pipeline().compile(), {"bids": qj.bid_events(data)}, n_nodes=1,
        cfg=SimConfig(**CFG),
    )
    m = eng.run()
    assert len(m.event_latencies) == len(data.bids)
    assert all(l >= 0 for l in m.event_latencies)


def test_engine_throughput_counted(data):
    eng = JetEngine(
        qj.q2_pipeline().compile(), {"bids": qj.bid_events(data)}, n_nodes=1,
        cfg=SimConfig(**CFG),
    )
    m = eng.run()
    assert sum(v for k, v in m.items.items() if k.startswith("f")) >= len(data.bids)
