"""Index construction timing and materialized size (Fig. 6 analogue).

Each scheme's frames are written as Parquet and on-disk bytes summed —
the stand-in for the paper's PostgreSQL tables + B-trees. Build time is
the wall time to construct *and materialize* the frames (Spark is lazy;
an unmaterialized build measures nothing).
"""
from __future__ import annotations

import os
import shutil
import tempfile
from dataclasses import dataclass
from time import perf_counter

from pyspark.sql import DataFrame

from . import advinverted, inverted, koko_index, subtree


def _dir_bytes(path: str) -> int:
    total = 0
    for root, _, files in os.walk(path):
        total += sum(os.path.getsize(os.path.join(root, f)) for f in files)
    return total


def materialized_bytes(frames: dict[str, DataFrame]) -> int:
    d = tempfile.mkdtemp(prefix="idx_size_")
    try:
        for name, df in frames.items():
            df.write.mode("overwrite").parquet(os.path.join(d, name))
        return _dir_bytes(d)
    finally:
        shutil.rmtree(d, ignore_errors=True)


@dataclass
class BuildReport:
    scheme: str
    build_seconds: float
    size_bytes: int
    n_rows: int


def _frames_of(scheme: str, tokens: DataFrame) -> dict[str, DataFrame]:
    if scheme == "koko":
        return koko_index.build(tokens).frames()
    if scheme == "inverted":
        return {"P": inverted.build(tokens)}
    if scheme == "advinverted":
        return {"P": advinverted.build(tokens)}
    if scheme == "subtree":
        return subtree.build(tokens).frames()
    raise ValueError(scheme)


SCHEMES = ("inverted", "advinverted", "koko", "subtree")


def build_report(scheme: str, tokens: DataFrame) -> BuildReport:
    t0 = perf_counter()
    frames = {k: df.cache() for k, df in _frames_of(scheme, tokens).items()}
    n_rows = sum(df.count() for df in frames.values())
    secs = perf_counter() - t0
    size = materialized_bytes(frames)
    for df in frames.values():
        df.unpersist()
    return BuildReport(scheme, secs, size, n_rows)
