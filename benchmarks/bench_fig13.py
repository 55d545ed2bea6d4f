"""Benchmark regenerating Fig 13 (Q5 with 1 s exactly-once checkpoints)."""


def test_fig13(spark, benchmark):
    mod = __import__("fig13_fault_tolerance")
    pdf, md = benchmark.pedantic(lambda: mod.run(spark), rounds=1, iterations=1)
    ft = float(pdf[pdf["guarantee"] == "exactly-once"]["p99_99"].iloc[0])
    benchmark.extra_info["FT p99.99 ms (paper: ~350)"] = round(ft)
    print(md)
    assert 250 < ft < 450
