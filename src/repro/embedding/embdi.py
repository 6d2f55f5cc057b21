"""EmbDI-like embedding baseline (paper §6.1 baseline 6, [7]).

EmbDI (Cappuzzo et al., SIGMOD 2020) embeds a relation by building a
tripartite graph — row nodes, column nodes, cell-value (token) nodes —
and training a word embedding on random walks over it (node2vec-style).
We reproduce that structure:

* graph: ``R<rid>`` row nodes, ``C<col>`` column nodes, and the same
  ``col=binlabel`` tokens used elsewhere in this repo as value nodes;
  edges row↔token (cell occurrences) and token↔column;
* corpus: fixed-length random walks started from every token node,
  alternating token → row/column → token;
* embedding: the same Spark MLlib Word2Vec as SubTab, trained on the
  walk corpus; only token-node vectors are kept.

Walk generation is driver-side NumPy over the binned code matrix (the
adjacency is row×column, exactly the table) — this is the *deliberately
slower* comparator from Fig 7; the training itself stays in Spark. The
paper reports EmbDI ≈ SubTab quality at ~26× the pre-processing time.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.binning.binner import BinnedTable
from repro.embedding.word2vec import CellVectors, train_cell_vectors
from repro.util import rng


def _token_matrix(binned_pdf: pd.DataFrame) -> tuple[np.ndarray, list[str]]:
    """Code matrix + the token string for every (column, code)."""
    tokens: list[str] = []
    code_of: dict[str, int] = {}
    codes = np.empty(binned_pdf.shape, dtype=np.int32)
    for j, c in enumerate(binned_pdf.columns):
        col_tokens = [f"{c}={v}" for v in binned_pdf[c].astype(str)]
        for i, t in enumerate(col_tokens):
            k = code_of.get(t)
            if k is None:
                k = len(tokens)
                code_of[t] = k
                tokens.append(t)
            codes[i, j] = k
    return codes, tokens


def embdi_walks(
    binned_pdf: pd.DataFrame,
    *,
    walks_per_token: int = 20,
    walk_len: int = 8,
    seed: int = 0,
) -> list[list[str]]:
    """Random token→row→token / token→column→token walks over the graph."""
    g = rng(seed)
    codes, tokens = _token_matrix(binned_pdf)
    n, m = codes.shape
    # Inverted index: token id → row indices containing it, per column.
    occurrences: dict[int, tuple[np.ndarray, int]] = {}
    for j in range(m):
        col = codes[:, j]
        for t in np.unique(col):
            occurrences[int(t)] = (np.flatnonzero(col == t), j)
    walks: list[list[str]] = []
    for t0 in range(len(tokens)):
        for _ in range(walks_per_token):
            walk = [tokens[t0]]
            t = t0
            for _ in range(walk_len - 1):
                rows_t, col_t = occurrences[t]
                if g.random() < 0.5:
                    # token → row → token of a random other column.
                    row = int(rows_t[g.integers(len(rows_t))])
                    walk.append(f"R{row}")
                    t = int(codes[row, g.integers(m)])
                else:
                    # token → column → token of the same column.
                    walk.append(f"C{col_t}")
                    row = int(g.integers(n))
                    t = int(codes[row, col_t])
                walk.append(tokens[t])
            walks.append(walk)
    return walks


def train_embdi_vectors(
    bt: BinnedTable,
    *,
    vector_size: int = 32,
    walks_per_token: int = 20,
    walk_len: int = 8,
    max_rows: int = 20_000,
    seed: int = 0,
) -> CellVectors:
    """Full EmbDI-like pre-processing: graph walks + Word2Vec training."""
    pdf = bt.binned_pandas()
    if len(pdf) > max_rows:
        pdf = pdf.sample(max_rows, random_state=seed)
    walks = embdi_walks(
        pdf, walks_per_token=walks_per_token, walk_len=walk_len, seed=seed
    )
    spark = bt.binned.sparkSession
    corpus = spark.createDataFrame(
        pd.DataFrame({"sentence": walks})
    )
    cv = train_cell_vectors(
        corpus,
        vector_size=vector_size,
        window=10,
        max_iter=2,
        seed=seed,
    )
    # Keep only cell tokens; row/column graph nodes are training scaffolding.
    cv.vectors = {
        t: v
        for t, v in cv.vectors.items()
        if not (t.startswith("R") or t.startswith("C")) or "=" in t
    }
    return cv
