"""Benchmark regenerating Fig 8 (p99 per query, 1 M ev/s, DOP 12→240)."""


def test_fig08(spark, benchmark):
    mod = __import__("fig08_latency_scaleout")
    pdf, md = benchmark.pedantic(lambda: mod.run(spark), rounds=1, iterations=1)
    worst = float(pdf["p99_99"].max())
    benchmark.extra_info["worst p99.99 ms (paper: <=16)"] = round(worst, 1)
    print(md)
    assert worst < 25
