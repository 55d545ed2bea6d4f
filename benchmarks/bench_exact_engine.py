"""Benchmark of the exact-mode engine: events/second of simulated
processing, plus the full validation job (correctness + exactly-once)."""
from repro.core.engine import JetEngine, SimConfig
from repro.nexmark import generator as gen
from repro.nexmark import queries_jet as qj


def test_exact_engine_q5_throughput(benchmark):
    data = gen.generate(rate=8_000, duration_s=1.0, n_keys=300, seed=5)

    def run():
        eng = JetEngine(
            qj.q5_pipeline(size_ms=1_000, slide_ms=250).compile(),
            {"bids": qj.bid_events(data)},
            n_nodes=2,
            cfg=SimConfig(threads_per_node=2),
        )
        eng.run()
        return eng

    eng = benchmark.pedantic(run, rounds=3, iterations=1)
    benchmark.extra_info["events"] = data.n_events
    assert eng.results()


def test_exact_engine_validation_job(spark, benchmark):
    mod = __import__("exact_engine_validation")
    pdf, md = benchmark.pedantic(lambda: mod.run(spark), rounds=1, iterations=1)
    print(md)
    assert bool(pdf["matches oracle"].all())
