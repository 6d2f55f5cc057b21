"""Word2Vec cell embedding (paper §5.1) via Spark MLlib.

Trains ``pyspark.ml.feature.Word2Vec`` on the tabular-sentence corpus
and returns a :class:`CellVectors` mapping each cell token
``"col=binlabel"`` to a dense vector. The vocabulary is tiny (columns ×
bins), so the learned vectors are collected to the driver and broadcast
to the row/column vector aggregation scans.
"""
from __future__ import annotations

import zlib
from dataclasses import dataclass

import numpy as np
from pyspark.ml.feature import Word2Vec
from pyspark.sql import DataFrame


def column_identity(col: str, dim: int) -> np.ndarray:
    """Deterministic unit direction for a column.

    Emulates the ``windowSize = max{n, m}`` limit of Alg 2: with a whole
    n-token column-sentence inside one window, same-column co-occurrence
    outweighs cross-column co-occurrence by ~n/m, so every cell vector
    converges to (column-identity direction) + (small pattern term).
    Training at that window size is intractable for any Word2Vec
    implementation, so the identity component is added analytically
    where it matters — column-vector construction. Row vectors are
    untouched: their identity terms sum to the same constant for every
    row of a given column set, which cancels under clustering.
    """
    g = np.random.default_rng(zlib.crc32(col.encode("utf8")))
    v = g.standard_normal(dim)
    return v / np.linalg.norm(v)


@dataclass
class CellVectors:
    """Learned cell-token embedding 𝓜 : T × U → R^γ (Alg 2 line 4)."""

    vectors: dict[str, np.ndarray]
    dim: int

    def get(self, token: str) -> np.ndarray | None:
        return self.vectors.get(token)

    def matrix(self, tokens: list[str]) -> np.ndarray:
        """Stacked vectors for tokens (zeros for out-of-vocabulary)."""
        out = np.zeros((len(tokens), self.dim))
        for i, t in enumerate(tokens):
            v = self.vectors.get(t)
            if v is not None:
                out[i] = v
        return out


def train_cell_vectors(
    corpus: DataFrame,
    *,
    vector_size: int = 32,
    window: int = 25,
    min_count: int = 1,
    max_iter: int = 1,
    seed: int = 0,
    num_partitions: int = 1,
) -> CellVectors:
    """Train the cell-token embedding on a sentence DataFrame.

    ``window`` is wide relative to tuple-sentence length (≤ m tokens) to
    emulate the paper's whole-sentence window; ``min_count=1`` because
    every token is a (column, bin) pair we must be able to embed.
    ``num_partitions=1`` keeps training deterministic (multi-partition
    Word2Vec is async-SGD and varies run to run, which makes the whole
    selection pipeline non-reproducible); the vocabulary is tiny, so
    the single-partition cost is negligible.
    """
    w2v = Word2Vec(
        vectorSize=vector_size,
        windowSize=window,
        minCount=min_count,
        maxIter=max_iter,
        seed=seed,
        numPartitions=num_partitions,
        inputCol="sentence",
        outputCol="__w2v",
    )
    model = w2v.fit(corpus)
    rows = model.getVectors().collect()
    vecs = {r["word"]: np.array(r["vector"].toArray()) for r in rows}
    return CellVectors(vectors=vecs, dim=vector_size)
