"""Benchmark regenerating Fig 7 (throughput/core vs latency, Q5 10 ms slide)."""


def test_fig07(spark, benchmark):
    mod = __import__("fig07_throughput_vs_latency")
    pdf, md = benchmark.pedantic(lambda: mod.run(spark), rounds=1, iterations=1)
    by_rate = pdf.sort_values("rate")
    benchmark.extra_info["p99.99@0.5M/core (paper ~13ms)"] = round(
        float(by_rate[by_rate["rate"] == 0.5e6 * 12]["p99_99"].iloc[0]), 1
    )
    benchmark.extra_info["p99.99@2.0M/core (paper ~98ms)"] = round(
        float(by_rate[by_rate["rate"] == 2.0e6 * 12]["p99_99"].iloc[0]), 1
    )
    print(md)
    assert by_rate["p99_99"].iloc[-1] > 3 * by_rate["p99_99"].iloc[0]
