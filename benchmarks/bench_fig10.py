"""Benchmark regenerating Fig 10 (throughput scale-out, 500 ms slide)."""


def test_fig10(spark, benchmark):
    mod = __import__("fig10_throughput_scaleout")
    pdf, md = benchmark.pedantic(lambda: mod.run(spark), rounds=1, iterations=1)
    t240 = float(pdf[pdf["n_nodes"] == 20]["max_throughput"].iloc[0])
    benchmark.extra_info["240-core M ev/s (paper: 468)"] = round(t240 / 1e6)
    print(md)
    assert 400e6 < t240 < 560e6
