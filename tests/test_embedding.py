"""Tests for the corpus builder, Word2Vec wrapper, and EmbDI baseline."""
import numpy as np
import pandas as pd
import pytest

from repro.binning.binner import bin_table
from repro.embedding.corpus import build_corpus, column_sentences, tuple_sentences
from repro.embedding.embdi import embdi_walks, train_embdi_vectors
from repro.embedding.word2vec import CellVectors, train_cell_vectors
from repro.util import RID, rng


@pytest.fixture(scope="module")
def small_bt(spark):
    g = rng(4)
    n = 500
    pdf = pd.DataFrame(
        {
            RID: np.arange(n),
            "X": g.choice(["a", "b"], n),
            "Y": g.choice(["p", "q", "r"], n),
            "Z": g.random(n) * 10,
        }
    )
    return bin_table(spark.createDataFrame(pdf), n_bins=3, seed=0)


def test_tuple_sentences(small_bt):
    s = tuple_sentences(small_bt).toPandas()
    assert len(s) == 500
    assert all(len(row) == 3 for row in s["sentence"])
    assert all(row[0].startswith("X=") for row in s["sentence"])


@pytest.mark.parametrize("chunk", [100, 200])
def test_column_sentences_chunking(small_bt, chunk):
    s = column_sentences(small_bt, chunk=chunk).toPandas()
    per_col = -(-500 // chunk)
    assert len(s) == 3 * per_col
    lengths = sorted(len(r) for r in s["sentence"])
    assert max(lengths) <= chunk
    assert sum(lengths) == 3 * 500


def test_column_sentences_are_single_column(small_bt):
    s = column_sentences(small_bt, chunk=100).toPandas()
    for row in s["sentence"]:
        prefixes = {t.partition("=")[0] for t in row}
        assert len(prefixes) == 1


def test_corpus_total(small_bt):
    # n tuple-sentences + column_rep × (3 cols × ceil(500/100) chunks).
    c = build_corpus(small_bt, chunk=100, cap=100_000, column_rep=1)
    assert c.count() == 500 + 3 * 5
    c4 = build_corpus(small_bt, chunk=100, cap=100_000, column_rep=4)
    assert c4.count() == 500 + 4 * 3 * 5


def test_corpus_cap_sampling(small_bt):
    c = build_corpus(small_bt, chunk=100, cap=200, seed=0)
    assert c.count() < 400  # sampled down (binomial around 200)


def test_train_cell_vectors_vocab(small_bt):
    corpus = build_corpus(small_bt, chunk=100)
    cv = train_cell_vectors(corpus, vector_size=16, max_iter=1, seed=0)
    assert cv.dim == 16
    binned = small_bt.binned_pandas()
    for c in binned.columns:
        for lab in binned[c].unique():
            v = cv.get(f"{c}={lab}")
            assert v is not None and v.shape == (16,)


def test_cooccurring_tokens_are_closer(spark):
    """Tokens that always co-occur must embed closer than ones that never do."""
    g = rng(5)
    n = 2000
    a = g.choice(["a1", "a2"], n)
    b = np.where(a == "a1", "b1", "b2")  # perfect co-occurrence
    pdf = pd.DataFrame({RID: np.arange(n), "A": a, "B": b})
    bt = bin_table(spark.createDataFrame(pdf), seed=0)
    cv = train_cell_vectors(build_corpus(bt), vector_size=16, max_iter=3, seed=0)

    def cos(u, v):
        return float(u @ v / (np.linalg.norm(u) * np.linalg.norm(v) + 1e-12))

    pair = cos(cv.get("A=a1"), cv.get("B=b1"))
    anti = cos(cv.get("A=a1"), cv.get("B=b2"))
    assert pair > anti


def test_cell_vectors_matrix():
    cv = CellVectors(vectors={"A=x": np.ones(4)}, dim=4)
    m = cv.matrix(["A=x", "missing"])
    assert m.shape == (2, 4)
    assert (m[0] == 1).all() and (m[1] == 0).all()


# ------------------------------------------------------------------ EmbDI
def test_embdi_walks_structure(small_bt):
    pdf = small_bt.binned_pandas()
    walks = embdi_walks(pdf, walks_per_token=2, walk_len=5, seed=0)
    tokens = {
        f"{c}={v}" for c in pdf.columns for v in pdf[c].astype(str).unique()
    }
    assert len(walks) == 2 * len(tokens)
    for w in walks[:50]:
        # Alternates token, graph-node, token, graph-node, token ...
        assert len(w) == 2 * 5 - 1
        for i, node in enumerate(w):
            if i % 2 == 0:
                assert "=" in node
            else:
                assert node[0] in "RC" and "=" not in node


def test_embdi_vectors_cover_tokens(small_bt):
    cv = train_embdi_vectors(small_bt, walks_per_token=3, walk_len=4, seed=0)
    pdf = small_bt.binned_pandas()
    covered = sum(
        cv.get(f"{c}={v}") is not None
        for c in pdf.columns
        for v in pdf[c].astype(str).unique()
    )
    total = sum(len(pdf[c].astype(str).unique()) for c in pdf.columns)
    assert covered == total
    # Graph scaffolding nodes are stripped.
    assert all("=" in t for t in cv.vectors)


def test_embdi_deterministic_walks(small_bt):
    pdf = small_bt.binned_pandas()
    w1 = embdi_walks(pdf, walks_per_token=2, walk_len=4, seed=3)
    w2 = embdi_walks(pdf, walks_per_token=2, walk_len=4, seed=3)
    assert w1 == w2
