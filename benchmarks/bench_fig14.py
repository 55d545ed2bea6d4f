"""Benchmark regenerating §7.7 (multi-tenancy: 100 concurrent jobs)."""


def test_fig14(spark, benchmark):
    mod = __import__("fig14_multitenancy")
    pdf, md = benchmark.pedantic(lambda: mod.run(spark), rounds=1, iterations=1)
    p = float(pdf[pdf["n_jobs"] == 100]["p99_99"].iloc[0])
    benchmark.extra_info["100-job p99.99 ms (paper: ~200)"] = round(p)
    print(md)
    assert 120 < p < 350
