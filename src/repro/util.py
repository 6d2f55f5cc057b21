"""Small shared helpers: stable row ids, timing, deterministic RNG."""
from __future__ import annotations

import time
from contextlib import contextmanager

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

RID = "__rid"


def with_rid(df: DataFrame) -> DataFrame:
    """Attach a stable row id column ``__rid`` if not already present.

    Uses ``zipWithIndex`` semantics via a window-free path:
    ``monotonically_increasing_id`` is *not* stable across recomputation,
    so the result must be (and is) derived from a deterministic ordering
    only when the caller did not supply ids. Dataset generators in this
    repo always embed ``__rid`` at generation time; this is a fallback
    for ad-hoc tables.
    """
    if RID in df.columns:
        return df
    return df.withColumn(RID, F.monotonically_increasing_id())


def rng(seed: int) -> np.random.Generator:
    """Deterministic NumPy generator (single convention repo-wide)."""
    return np.random.default_rng(seed)


@contextmanager
def timer():
    """``with timer() as t: ...; t()`` → elapsed seconds (float)."""
    start = time.perf_counter()
    yield lambda: time.perf_counter() - start


def data_columns(df: DataFrame) -> list[str]:
    """All columns except the internal row-id column."""
    return [c for c in df.columns if c != RID]
