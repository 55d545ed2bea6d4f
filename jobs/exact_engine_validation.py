"""Exact-mode engine validation job: correctness + exactly-once demo.

Runs the Jet-engine NEXMark pipelines on a 3-node simulated cluster,
checks Q1/Q5/Q8 results against DuckDB, and demonstrates exactly-once
output under an injected node crash. This is the spark-submit-able twin
of ``tests/test_engine_queries.py`` / ``tests/test_fault_tolerance.py``.
"""
from collections import Counter

import duckdb
import pandas as pd

from repro.core.engine import JetEngine, SimConfig
from repro.harness.report import table
from repro.nexmark import generator as gen
from repro.nexmark import queries_jet as qj
from repro.nexmark.queries_batch import Q1_SQL, q5_sql, q8_sql


def _duck(sql, **tables):
    con = duckdb.connect()
    for k, t in tables.items():
        con.register(k, t)
    rows = con.execute(sql).fetchall()
    con.close()
    return {tuple(round(c, 4) if isinstance(c, float) else c for c in r) for r in rows}


def run(spark):
    data = gen.generate(rate=4_000, duration_s=1.0, n_keys=300, seed=7)
    rows = []

    def check(name, pipeline, sources, cols, want):
        eng = JetEngine(
            pipeline.compile(), sources, n_nodes=3,
            cfg=SimConfig(threads_per_node=2),
        )
        eng.run()
        got = {
            tuple(round(d[c], 4) if isinstance(d[c], float) else d[c] for c in cols)
            for d in eng.results()
        }
        rows.append({"check": name, "rows": len(eng.results()), "matches oracle": got == want})
        return eng

    check(
        "Q1 engine == DuckDB",
        qj.q1_pipeline(), {"bids": qj.bid_events(data)},
        ["auction", "bidder", "price_eur", "ts_ms"], _duck(Q1_SQL, bids=data.bids),
    )
    check(
        "Q5 engine == DuckDB",
        qj.q5_pipeline(size_ms=1_000, slide_ms=250), {"bids": qj.bid_events(data)},
        ["window_start", "auction", "n_bids"],
        _duck(q5_sql(size_ms=1_000, slide_ms=250), bids=data.bids),
    )
    check(
        "Q8 engine == DuckDB",
        qj.q8_pipeline(size_ms=500),
        {"persons": qj.person_events(data), "auctions": qj.auction_events(data)},
        ["id", "name", "window_start"], _duck(q8_sql(size_ms=500),
                                              persons=data.persons, auctions=data.auctions),
    )

    # exactly-once under a crash
    def xo_engine():
        return JetEngine(
            qj.q5_pipeline(size_ms=1_000, slide_ms=250).compile(),
            {"bids": qj.bid_events(data)},
            n_nodes=3,
            cfg=SimConfig(threads_per_node=2, guarantee="exactly-once",
                          snapshot_interval_ms=250),
        )

    clean, crashed = xo_engine(), xo_engine()
    clean.run()
    crashed.run(fail_at=[(600, 1)])
    cols = ["window_start", "auction", "n_bids"]

    def ms(e):
        return Counter(tuple(d[c] for c in cols) for d in e.results())

    rows.append(
        {
            "check": "exactly-once: crash run == clean run",
            "rows": len(crashed.results()),
            "matches oracle": ms(clean) == ms(crashed),
        }
    )
    md = table(
        "Exact-mode engine validation (3 simulated nodes)",
        rows,
        ["check", "rows", "matches oracle"],
    )
    return pd.DataFrame(rows), md


if __name__ == "__main__":
    from _common import run_main

    run_main(run, "exact-engine")
