"""Exactly-once delivery sinks for Structured Streaming (§4.5).

The paper's two sink-side routes to the exactly-once *delivery*
guarantee, realised over the local filesystem for Spark's
``foreachBatch``:

* :class:`IdempotentParquetSink` — idempotent writes: each micro-batch
  is written to a deterministic per-batch directory with overwrite
  semantics and then marked committed by an atomic marker-file create.
  Re-running a batch after recovery rewrites the same directory — "the
  exact same effect irrespective of the number of times applied".
* :class:`TwoPhaseCommitSink` — a transactional sink: output is staged
  (prepare) and only made visible to readers by an atomic rename
  (commit), mirroring the commit-prepare/commit split that Jet runs
  around its checkpoints.

Readers (:meth:`read_committed`) only ever observe committed output, so
pairing either sink with Spark's checkpointed, replayable file source
gives end-to-end exactly-once — the Structured Streaming mapping of the
paper's guarantee stack.
"""
import os
import shutil

from pyspark.sql import DataFrame, SparkSession


class IdempotentParquetSink:
    """``foreachBatch``-compatible idempotent parquet sink."""

    def __init__(self, root: str):
        self.root = root
        os.makedirs(os.path.join(root, "commits"), exist_ok=True)

    def __call__(self, batch_df: DataFrame, batch_id: int) -> None:
        """Write one micro-batch idempotently keyed by ``batch_id``."""
        path = os.path.join(self.root, f"batch-{batch_id:010d}")
        batch_df.write.mode("overwrite").parquet(path)
        marker = os.path.join(self.root, "commits", str(batch_id))
        # atomic create-if-absent; re-commit after recovery is a no-op
        try:
            with open(marker, "x"):
                pass
        except FileExistsError:
            pass

    def committed_batches(self) -> list[int]:
        return sorted(int(f) for f in os.listdir(os.path.join(self.root, "commits")))

    def read_committed(self, spark: SparkSession) -> DataFrame:
        """All rows of committed batches (uncommitted dirs invisible)."""
        paths = [
            os.path.join(self.root, f"batch-{b:010d}") for b in self.committed_batches()
        ]
        if not paths:
            raise ValueError("no committed batches")
        return spark.read.parquet(*paths)


class TwoPhaseCommitSink:
    """``foreachBatch``-compatible transactional (2PC) parquet sink.

    ``prepare`` happens inside the batch function (stage directory);
    the commit is the atomic rename into ``committed/``. A batch id
    that is already committed is skipped entirely, so replays after a
    recovery are deduplicated.
    """

    def __init__(self, root: str):
        self.root = root
        os.makedirs(os.path.join(root, "staging"), exist_ok=True)
        os.makedirs(os.path.join(root, "committed"), exist_ok=True)

    def _committed_path(self, batch_id: int) -> str:
        return os.path.join(self.root, "committed", f"epoch-{batch_id:010d}")

    def __call__(self, batch_df: DataFrame, batch_id: int) -> None:
        if os.path.exists(self._committed_path(batch_id)):
            return  # already durable: replay is a no-op
        stage = os.path.join(self.root, "staging", f"epoch-{batch_id:010d}")
        if os.path.exists(stage):
            shutil.rmtree(stage)  # half-written prepare from a crash
        batch_df.write.mode("overwrite").parquet(stage)  # phase 1: prepare
        os.rename(stage, self._committed_path(batch_id))  # phase 2: commit

    def committed_batches(self) -> list[int]:
        out = []
        for d in os.listdir(os.path.join(self.root, "committed")):
            out.append(int(d.split("-")[1]))
        return sorted(out)

    def read_committed(self, spark: SparkSession) -> DataFrame:
        paths = [self._committed_path(b) for b in self.committed_batches()]
        if not paths:
            raise ValueError("no committed epochs")
        return spark.read.parquet(*paths)
