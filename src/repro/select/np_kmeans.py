"""Driver-side KMeans (kmeans++ init + Lloyd iterations).

Used on the *interactive* selection path (session replay, Fig 6): after
pre-processing, SubTab's per-query work is clustering a few thousand
small vectors, which the paper runs in-process in "a few seconds". A
Spark KMeans job per replayed query would measure scheduler overhead,
not the algorithm, so the replay harness uses this NumPy implementation
— the distributed path in :mod:`repro.select.centroids` remains the
default for one-off selections and is tested to agree in behaviour.
"""
from __future__ import annotations

import numpy as np

from repro.util import rng


def kmeans(
    x: np.ndarray, k: int, *, seed: int = 0, iters: int = 25
) -> tuple[np.ndarray, np.ndarray]:
    """Lloyd's algorithm with kmeans++ seeding.

    Returns (centers k×d, assignment n). ``k`` is clamped to ``len(x)``.
    """
    n = len(x)
    k = min(k, n)
    g = rng(seed)
    # kmeans++ seeding.
    centers = np.empty((k, x.shape[1]))
    centers[0] = x[g.integers(n)]
    d2 = ((x - centers[0]) ** 2).sum(axis=1)
    for i in range(1, k):
        total = d2.sum()
        if total <= 0:
            centers[i:] = x[g.integers(n, size=k - i)]
            break
        centers[i] = x[g.choice(n, p=d2 / total)]
        d2 = np.minimum(d2, ((x - centers[i]) ** 2).sum(axis=1))
    assign = np.zeros(n, dtype=np.int64)
    x_sq = (x**2).sum(axis=1)
    for _ in range(iters):
        # ||x−c||² = ||x||² − 2x·c + ||c||², argmin over c.
        d = x_sq[:, None] - 2 * (x @ centers.T) + (centers**2).sum(axis=1)[None, :]
        new_assign = d.argmin(axis=1)
        if (new_assign == assign).all():
            assign = new_assign
            break
        assign = new_assign
        for c in range(k):
            members = x[assign == c]
            if len(members):
                centers[c] = members.mean(axis=0)
    return centers, assign


def centroid_points(
    x: np.ndarray, k: int, *, seed: int = 0
) -> list[int]:
    """Indices of the actual points nearest each cluster center —
    the NumPy twin of :func:`repro.select.centroids.select_centroids`."""
    n = len(x)
    if n <= k:
        return list(range(n))
    centers, assign = kmeans(x, k, seed=seed)
    picked: list[int] = []
    for c in range(len(centers)):
        members = np.flatnonzero(assign == c)
        if not len(members):
            continue
        d = ((x[members] - centers[c]) ** 2).sum(axis=1)
        picked.append(int(members[d.argmin()]))
    return sorted(set(picked))
