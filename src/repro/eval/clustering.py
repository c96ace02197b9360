"""Clustering algorithms implemented from scratch (numpy).

The unsupervised baselines cluster per-name paper sets: ANON and Aminer use
hierarchical agglomerative clustering (HAC), NetE and GHOST use Affinity
Propagation (AP) — plus a DBSCAN density fallback standing in for NetE's
HDBSCAN (no sklearn/hdbscan offline; see DESIGN.md substitutions). Per-name
instances are small (tens to a few hundred papers), so the O(n²)–O(n³)
reference algorithms are appropriate.
"""
from __future__ import annotations

import numpy as np


def hac_average(dist: np.ndarray, *, threshold: float) -> np.ndarray:
    """Average-linkage agglomerative clustering on a distance matrix.

    Merges the closest pair of clusters while the (average-linkage) distance
    is ≤ ``threshold``. Returns integer labels (0..k-1).
    """
    n = len(dist)
    if n == 0:
        return np.zeros(0, dtype=int)
    d = dist.astype(float).copy()
    np.fill_diagonal(d, np.inf)
    clusters: dict[int, list[int]] = {i: [i] for i in range(n)}
    active = set(range(n))
    while len(active) > 1:
        ids = sorted(active)
        sub = d[np.ix_(ids, ids)]
        k = int(np.argmin(sub))
        i, j = divmod(k, len(ids))
        if sub[i, j] > threshold:
            break
        ci, cj = ids[i], ids[j]
        ni, nj = len(clusters[ci]), len(clusters[cj])
        # Lance–Williams update for average linkage.
        for other in active - {ci, cj}:
            d[ci, other] = d[other, ci] = (
                ni * d[ci, other] + nj * d[cj, other]
            ) / (ni + nj)
        clusters[ci].extend(clusters[cj])
        del clusters[cj]
        active.remove(cj)
        d[cj, :] = d[:, cj] = np.inf
    labels = np.empty(n, dtype=int)
    for lab, members in enumerate(clusters.values()):
        labels[members] = lab
    return labels


def affinity_propagation(
    sim: np.ndarray,
    *,
    damping: float = 0.7,
    max_iter: int = 200,
    convergence_iter: int = 15,
    preference: float | None = None,
    seed: int = 0,
) -> np.ndarray:
    """Affinity Propagation (Frey & Dueck 2007) on a similarity matrix."""
    n = len(sim)
    if n == 0:
        return np.zeros(0, dtype=int)
    if n == 1:
        return np.zeros(1, dtype=int)
    S = sim.astype(float).copy()
    rng = np.random.default_rng(seed)
    pref = np.median(S[~np.eye(n, dtype=bool)]) if preference is None else preference
    np.fill_diagonal(S, pref)
    # Tiny noise breaks degeneracies (as in the reference implementation).
    S = S + 1e-12 * rng.standard_normal((n, n)) * (np.abs(S).max() + 1e-12)
    R = np.zeros((n, n))
    A = np.zeros((n, n))
    stable = 0
    last = None
    for _ in range(max_iter):
        AS = A + S
        idx = np.argmax(AS, axis=1)
        first = AS[np.arange(n), idx]
        AS[np.arange(n), idx] = -np.inf
        second = AS.max(axis=1)
        Rnew = S - first[:, None]
        Rnew[np.arange(n), idx] = S[np.arange(n), idx] - second
        R = damping * R + (1 - damping) * Rnew
        Rp = np.maximum(R, 0)
        np.fill_diagonal(Rp, R.diagonal())
        Anew = Rp.sum(axis=0)[None, :] - Rp
        dA = Anew.diagonal().copy()
        Anew = np.minimum(Anew, 0)
        np.fill_diagonal(Anew, dA)
        A = damping * A + (1 - damping) * Anew
        exemplars = np.flatnonzero((A + R).diagonal() > 0)
        key = tuple(exemplars.tolist())
        if key == last:
            stable += 1
            if stable >= convergence_iter:
                break
        else:
            stable = 0
            last = key
    exemplars = np.flatnonzero((A + R).diagonal() > 0)
    if len(exemplars) == 0:
        exemplars = np.array([int(np.argmax(S.diagonal()))])
    labels = np.argmax(S[:, exemplars], axis=1)
    labels[exemplars] = np.arange(len(exemplars))
    return labels


def dbscan(dist: np.ndarray, *, eps: float, min_samples: int = 2) -> np.ndarray:
    """DBSCAN on a distance matrix; noise points become singleton clusters
    (author disambiguation must label every paper)."""
    n = len(dist)
    labels = np.full(n, -1)
    visited = np.zeros(n, dtype=bool)
    cid = 0
    for i in range(n):
        if visited[i]:
            continue
        visited[i] = True
        nbrs = list(np.flatnonzero(dist[i] <= eps))
        if len(nbrs) < min_samples:
            continue
        labels[i] = cid
        queue = [j for j in nbrs if j != i]
        while queue:
            j = queue.pop()
            if not visited[j]:
                visited[j] = True
                nn = list(np.flatnonzero(dist[j] <= eps))
                if len(nn) >= min_samples:
                    queue.extend(k for k in nn if labels[k] == -1)
            if labels[j] == -1:
                labels[j] = cid
        cid += 1
    for i in range(n):
        if labels[i] == -1:
            labels[i] = cid
            cid += 1
    return labels
