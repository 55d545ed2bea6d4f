"""Benchmark regenerating Fig 9 (latency distribution at DOP=240)."""


def test_fig09(spark, benchmark):
    mod = __import__("fig09_latency_distribution")
    pdf, md = benchmark.pedantic(lambda: mod.run(spark), rounds=1, iterations=1)
    benchmark.extra_info["worst p99.9 ms (paper: <=10)"] = round(float(pdf["p99_9"].max()), 1)
    print(md)
    assert float(pdf["p99_9"].max()) <= 12
