"""Replayable file-based sources for Structured Streaming (§4.5).

Jet requires sources to be *replayable* — able to re-serve data from a
recorded offset after recovery. Structured Streaming's file source has
exactly this property: processed-file offsets live in the query's
checkpoint, and restarting a query with the same checkpoint resumes
precisely after the last committed batch. This module materialises a
generated NEXMark stream as a directory of ordered parquet chunks so
tests can (a) stream it incrementally (``maxFilesPerTrigger=1``) and
(b) kill/restart queries to exercise the replay path.
"""
import os

import numpy as np
import pandas as pd


def write_chunks(pdf: pd.DataFrame, out_dir: str, *, n_chunks: int) -> list[str]:
    """Split ``pdf`` (already sorted by arrival) into ``n_chunks``
    parquet files named in arrival order; returns the file paths."""
    os.makedirs(out_dir, exist_ok=True)
    paths = []
    for i, part in enumerate(np.array_split(np.arange(len(pdf)), n_chunks)):
        if len(part) == 0:
            continue
        path = os.path.join(out_dir, f"chunk-{i:05d}.parquet")
        pdf.iloc[part].to_parquet(path, index=False)
        paths.append(path)
    return paths


def append_chunk(pdf: pd.DataFrame, out_dir: str, *, idx: int) -> str:
    """Append one more chunk (late-arriving data after a restart)."""
    path = os.path.join(out_dir, f"chunk-{idx:05d}.parquet")
    pdf.to_parquet(path, index=False)
    return path


def with_flush_sentinel(pdf: pd.DataFrame, *, ts_col: str = "ts_ms", advance_ms: int) -> pd.DataFrame:
    """Append one far-future sentinel row that pushes the event-time
    watermark past every real window so append-mode aggregations emit
    them. Sentinel rows carry negative keys and are filtered from
    results. Numeric columns are bumped; string columns marked."""
    sentinel = {c: (0 if pd.api.types.is_numeric_dtype(pdf[c]) else "__sentinel__") for c in pdf.columns}
    for key_col in ("auction", "id", "seller", "bidder"):
        if key_col in sentinel:
            sentinel[key_col] = -1
    sentinel[ts_col] = int(pdf[ts_col].max()) + advance_ms
    if "arrival_ms" in sentinel:
        sentinel["arrival_ms"] = sentinel[ts_col]
    out = pd.concat([pdf, pd.DataFrame([sentinel])], ignore_index=True)
    return out.astype(pdf.dtypes.to_dict())
