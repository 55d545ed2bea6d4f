"""SF≈0.1 batch NEXMark queries through Catalyst (shuffle paths on)."""
import pytest

from repro.nexmark import generator as gen
from repro.nexmark import queries_batch as q


@pytest.fixture(scope="module")
def big(spark):
    # ~1M events (≈920k bids) — the SF~0.1 benchmark scale
    data = gen.generate(rate=100_000, duration_s=10.0, n_keys=10_000, seed=2)
    frames = gen.to_spark(spark, data)
    for f in frames.values():
        f.cache().count()
    return frames


def test_q1_batch_sf01(big, benchmark):
    n = benchmark.pedantic(lambda: q.q1(big["bids"]).count(), rounds=3, iterations=1)
    assert n > 800_000


def test_q2_batch_sf01(big, benchmark):
    n = benchmark.pedantic(lambda: q.q2(big["bids"]).count(), rounds=3, iterations=1)
    assert n > 0


def test_q5_batch_sf01(big, benchmark):
    n = benchmark.pedantic(
        lambda: q.q5(big["bids"], size_ms=10_000, slide_ms=2_000).count(),
        rounds=1,
        iterations=1,
    )
    assert n > 0


def test_q8_batch_sf01(big, benchmark):
    n = benchmark.pedantic(
        lambda: q.q8(big["persons"], big["auctions"], size_ms=10_000).count(),
        rounds=1,
        iterations=1,
    )
    assert n > 0
