"""Benchmark regenerating Fig 12 (latency on 10 nodes, FT off)."""


def test_fig12(spark, benchmark):
    mod = __import__("fig12_latency_10nodes")
    pdf, md = benchmark.pedantic(lambda: mod.run(spark), rounds=1, iterations=1)
    q1 = float(pdf[pdf["query"] == "q1"]["p99_99"].iloc[0])
    benchmark.extra_info["Q1 p99.99 ms (paper: <=1)"] = round(q1, 2)
    print(md)
    assert q1 < 2
