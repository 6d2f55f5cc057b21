"""Tabular-sentence corpus (paper §5.1, pre-processing step 2).

The binned table is serialized into a corpus of sentences in which each
cell token ``"col=binlabel"`` is one word:

* **tuple-sentences** — the tokens of each row (one sentence per row);
* **column-sentences** — the tokens of each column in row order, chunked
  into segments of ≤ ``chunk`` tokens. The paper sets
  ``windowSize = max{n, m}`` so a whole sentence fits in one window; a
  6M-token sentence is not trainable in any Word2Vec implementation, so
  chunking + a wide window is our documented substitution (DESIGN.md §5)
  — co-occurrence within a column is still what the model sees.

The corpus is capped at ``cap`` sentences chosen uniformly at random
(§5.1 caps at 100K).
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.binning.binner import BinnedTable
from repro.rules.apriori import transactions
from repro.util import RID


def tuple_sentences(bt: BinnedTable) -> DataFrame:
    """One sentence per row: all its cell tokens."""
    return transactions(bt).select(F.col("items").alias("sentence"))


def column_sentences(bt: BinnedTable, *, chunk: int = 200) -> DataFrame:
    """Column-major sentences, chunked to ≤ ``chunk`` tokens each.

    Single shuffle: explode to (column, position, token) long format,
    group by (column, position // chunk), collect in position order.
    """
    pos = F.row_number().over(Window.orderBy(RID)) - 1
    wide = bt.binned.withColumn("__pos", pos)
    long = wide.select(
        "__pos",
        F.explode(
            F.array(
                *[
                    F.struct(
                        F.lit(c).alias("col"),
                        F.concat(F.lit(f"{c}="), F.col(c).cast("string")).alias(
                            "token"
                        ),
                    )
                    for c in bt.columns
                ]
            )
        ).alias("cell"),
    ).select("__pos", "cell.col", "cell.token")
    return (
        long.withColumn("__chunk", (F.col("__pos") / chunk).cast("long"))
        .groupBy("col", "__chunk")
        .agg(
            F.array_sort(
                F.collect_list(F.struct("__pos", "token"))
            ).alias("cells")
        )
        .select(F.transform("cells", lambda s: s["token"]).alias("sentence"))
    )


def build_corpus(
    bt: BinnedTable,
    *,
    chunk: int = 200,
    cap: int = 100_000,
    column_rep: int = 4,
    seed: int = 0,
) -> DataFrame:
    """Tuple- + column-sentences, uniformly sampled down to ≤ ``cap``.

    ``column_rep`` replicates the column-sentences: the paper trains
    with ``windowSize = max{n, m}``, i.e. a whole n-token column-
    sentence sits in one window, which makes same-column co-occurrence
    outweigh cross-column (tuple) co-occurrence by ~n/m. Chunked
    sentences lose that dominance, so we restore the balance by
    repetition. The effect is structural and load-bearing: cell vectors
    become column-identity direction + pattern component, so row
    vectors (whose identity parts sum to a constant) cluster by pattern
    while column vectors stay near-orthogonal — column selection is
    pattern-informed but not collapsed onto one column per correlated
    family (cf. the family-heavy columns of the paper's Fig 2 output).
    """
    cols = column_sentences(bt, chunk=chunk)
    corpus = tuple_sentences(bt)
    for _ in range(max(column_rep, 1)):
        corpus = corpus.unionAll(cols)
    per_col = -(-bt.n_rows // chunk)  # ceil(n / chunk)
    total = bt.n_rows + max(column_rep, 1) * per_col * len(bt.columns)
    if total > cap:
        corpus = corpus.sample(cap / total, seed=seed)
    return corpus
