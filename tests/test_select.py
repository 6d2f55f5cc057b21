"""Tests for centroid selection (Spark KMeans + NumPy twin)."""
import numpy as np
import pandas as pd
import pytest

from repro.select.centroids import select_centroids
from repro.select.np_kmeans import centroid_points, kmeans
from repro.util import rng


def _three_clusters(seed=0, per=50):
    g = rng(seed)
    pts = np.concatenate(
        [
            g.normal((0, 0), 0.1, (per, 2)),
            g.normal((10, 0), 0.1, (per, 2)),
            g.normal((0, 10), 0.1, (per, 2)),
        ]
    )
    return pts


# -------------------------------------------------------------- np kmeans
def test_np_kmeans_recovers_clusters():
    pts = _three_clusters()
    centers, assign = kmeans(pts, 3, seed=0)
    # Each true cluster is assigned one label uniformly.
    for block in range(3):
        labels = assign[block * 50 : (block + 1) * 50]
        assert len(set(labels.tolist())) == 1
    assert len({assign[0], assign[50], assign[100]}) == 3


def test_np_centroid_points_one_per_cluster():
    pts = _three_clusters()
    picked = centroid_points(pts, 3, seed=0)
    assert len(picked) == 3
    blocks = sorted(p // 50 for p in picked)
    assert blocks == [0, 1, 2]


def test_np_centroid_points_small_input():
    pts = np.zeros((2, 3))
    assert centroid_points(pts, 5) == [0, 1]


def test_np_kmeans_k_clamped():
    pts = np.ones((3, 2))
    centers, assign = kmeans(pts, 10, seed=0)
    assert len(centers) == 3


def test_np_kmeans_deterministic():
    pts = _three_clusters(seed=2)
    c1, a1 = kmeans(pts, 3, seed=5)
    c2, a2 = kmeans(pts, 3, seed=5)
    assert (a1 == a2).all() and np.allclose(c1, c2)


# ------------------------------------------------------------ Spark twin
@pytest.fixture(scope="module")
def cluster_df(spark):
    pts = _three_clusters(seed=1)
    pdf = pd.DataFrame(
        {"id": np.arange(len(pts)), "vec": [list(map(float, p)) for p in pts]}
    )
    return spark.createDataFrame(pdf)


def test_select_centroids_one_per_cluster(cluster_df):
    ids = select_centroids(cluster_df, k=3, id_col="id", seed=0)
    assert len(ids) == 3
    assert sorted(i // 50 for i in ids) == [0, 1, 2]


def test_select_centroids_all_when_small(spark):
    pdf = pd.DataFrame({"id": [1, 2], "vec": [[0.0, 0.0], [1.0, 1.0]]})
    df = spark.createDataFrame(pdf)
    assert sorted(select_centroids(df, k=5, id_col="id")) == [1, 2]


def test_select_centroids_string_ids(spark):
    pts = _three_clusters(seed=3, per=20)
    pdf = pd.DataFrame(
        {
            "col": [f"c{i}" for i in range(len(pts))],
            "vec": [list(map(float, p)) for p in pts],
        }
    )
    ids = select_centroids(spark.createDataFrame(pdf), k=3, id_col="col")
    assert len(ids) == 3 and all(isinstance(i, str) for i in ids)


def test_select_centroids_duplicate_points(spark):
    """Duplicate-heavy input (the 4.1 block-solver crash case)."""
    pdf = pd.DataFrame(
        {"id": range(40), "vec": [[float(i % 2), 0.0] for i in range(40)]}
    )
    ids = select_centroids(spark.createDataFrame(pdf), k=7, id_col="id", seed=0)
    assert 1 <= len(ids) <= 7


def test_centroid_is_nearest_point(cluster_df):
    """The returned id is the member closest to its cluster center."""
    ids = select_centroids(cluster_df, k=3, id_col="id", seed=0)
    pts = np.stack(cluster_df.toPandas()["vec"].apply(np.array))
    for i in ids:
        block = i // 50
        members = pts[block * 50 : (block + 1) * 50]
        center = members.mean(axis=0)
        d = ((members - center) ** 2).sum(axis=1)
        assert d[i - block * 50] <= d.min() + 0.05  # near-nearest
