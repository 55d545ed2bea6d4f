"""Benchmark for the design-decision baselines (cooperative vs
preemptive scheduling, tuned vs stop-the-world GC)."""


def test_baselines(spark, benchmark):
    mod = __import__("baseline_schedulers")
    pdf, md = benchmark.pedantic(lambda: mod.run(spark), rounds=1, iterations=1)
    coop = pdf[(pdf["scheduler"] == "cooperative") & (pdf["gc_name"] == "g1-tuned")]
    worst = pdf[(pdf["scheduler"] == "preemptive") & (pdf["gc_name"] == "stw-baseline")]
    ratio = float(worst["p99_99"].iloc[0]) / float(coop["p99_99"].iloc[0])
    benchmark.extra_info["preemptive+STW / Jet p99.99 ratio"] = round(ratio, 1)
    print(md)
    assert ratio > 3
