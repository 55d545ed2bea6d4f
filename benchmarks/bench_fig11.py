"""Benchmark regenerating Fig 11 (latency on 5 nodes, FT off)."""


def test_fig11(spark, benchmark):
    mod = __import__("fig11_latency_5nodes")
    pdf, md = benchmark.pedantic(lambda: mod.run(spark), rounds=1, iterations=1)
    q5 = float(pdf[pdf["query"] == "q5"]["p99_99"].iloc[0])
    benchmark.extra_info["Q5 p99.99 ms (paper: 11-12)"] = round(q5, 1)
    print(md)
    assert 5 < q5 < 20
