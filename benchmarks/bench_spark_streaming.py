"""Measured Structured Streaming micro-batch latency — the real
'existing system' comparator for the paper's §1 premise."""


def test_spark_streaming_latency(spark, benchmark):
    mod = __import__("spark_streaming_latency")
    pdf, md = benchmark.pedantic(lambda: mod.run(spark), rounds=1, iterations=1)
    q5_p50 = float(pdf[pdf["query"] == "q5"]["p50"].iloc[0])
    benchmark.extra_info["Q5 micro-batch p50 ms"] = round(q5_p50)
    print(md)
    # a micro-batch engine's per-trigger floor sits far above Jet's
    # single-digit-ms tail — the premise of the paper, measured
    assert q5_p50 > 20
