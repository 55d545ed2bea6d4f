"""Exactly-once sink and replayable-source substrate tests."""
import os

import pandas as pd
import pytest

from repro.nexmark import generator as gen
from repro.sinks.exactly_once import IdempotentParquetSink, TwoPhaseCommitSink
from repro.sinks.replayable import append_chunk, with_flush_sentinel, write_chunks


@pytest.fixture
def small_df(spark):
    return spark.createDataFrame(pd.DataFrame({"k": [1, 2, 3], "v": ["a", "b", "c"]}))


# -- idempotent sink ----------------------------------------------------


def test_idempotent_sink_single_write(spark, small_df, tmp_path):
    sink = IdempotentParquetSink(str(tmp_path / "s"))
    sink(small_df, 0)
    assert sink.read_committed(spark).count() == 3
    assert sink.committed_batches() == [0]


def test_idempotent_sink_replay_is_noop(spark, small_df, tmp_path):
    sink = IdempotentParquetSink(str(tmp_path / "s"))
    sink(small_df, 0)
    sink(small_df, 0)  # recovery replays the same batch id
    assert sink.read_committed(spark).count() == 3


def test_idempotent_sink_accumulates_batches(spark, small_df, tmp_path):
    sink = IdempotentParquetSink(str(tmp_path / "s"))
    sink(small_df, 0)
    sink(small_df, 1)
    assert sink.read_committed(spark).count() == 6
    assert sink.committed_batches() == [0, 1]


def test_idempotent_sink_empty_raises(spark, tmp_path):
    sink = IdempotentParquetSink(str(tmp_path / "s"))
    with pytest.raises(ValueError):
        sink.read_committed(spark)


# -- two-phase commit sink ----------------------------------------------


def test_2pc_sink_commit_visible(spark, small_df, tmp_path):
    sink = TwoPhaseCommitSink(str(tmp_path / "t"))
    sink(small_df, 7)
    assert sink.committed_batches() == [7]
    assert sink.read_committed(spark).count() == 3


def test_2pc_sink_replay_skipped(spark, small_df, tmp_path):
    sink = TwoPhaseCommitSink(str(tmp_path / "t"))
    sink(small_df, 7)
    sink(small_df, 7)
    assert sink.read_committed(spark).count() == 3


def test_2pc_sink_stale_prepare_cleaned(spark, small_df, tmp_path):
    sink = TwoPhaseCommitSink(str(tmp_path / "t"))
    # simulate a crash mid-prepare: stale staging dir for the epoch
    stale = os.path.join(str(tmp_path / "t"), "staging", f"epoch-{3:010d}")
    os.makedirs(stale)
    with open(os.path.join(stale, "junk"), "w") as f:
        f.write("partial")
    sink(small_df, 3)
    assert sink.read_committed(spark).count() == 3


def test_2pc_staging_invisible_to_readers(spark, small_df, tmp_path):
    sink = TwoPhaseCommitSink(str(tmp_path / "t"))
    sink(small_df, 1)
    stale = os.path.join(str(tmp_path / "t"), "staging", f"epoch-{9:010d}")
    os.makedirs(stale)
    assert sink.read_committed(spark).count() == 3  # staged epoch ignored


# -- replayable chunked source ------------------------------------------


def test_write_chunks_roundtrip(tmp_path):
    d = gen.generate(rate=2_000, duration_s=1.0, seed=1)
    paths = write_chunks(d.bids, str(tmp_path / "in"), n_chunks=4)
    assert len(paths) == 4
    back = pd.concat([pd.read_parquet(p) for p in paths], ignore_index=True)
    assert back.equals(d.bids.reset_index(drop=True))


def test_append_chunk_sorts_after(tmp_path):
    d = gen.generate(rate=1_000, duration_s=0.5, seed=1)
    write_chunks(d.bids, str(tmp_path / "in"), n_chunks=2)
    p = append_chunk(d.bids.head(5), str(tmp_path / "in"), idx=2)
    assert sorted(os.listdir(tmp_path / "in"))[-1] == os.path.basename(p)


def test_flush_sentinel_pushes_event_time():
    d = gen.generate(rate=1_000, duration_s=0.5, seed=1)
    out = with_flush_sentinel(d.bids, advance_ms=60_000)
    assert len(out) == len(d.bids) + 1
    assert out.iloc[-1]["auction"] == -1
    assert out.iloc[-1]["ts_ms"] == d.bids["ts_ms"].max() + 60_000
    assert (out.dtypes == d.bids.dtypes).all()
