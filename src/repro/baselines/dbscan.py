"""DBSCAN baseline (density family), from scratch.

Classic Ester et al. 1996 semantics: core points have >= ``min_pts``
neighbours within ``eps`` (self included, sklearn convention); clusters
are the connected components of core points under the eps-neighbour
relation; border points attach to any neighbouring core's cluster; the
rest is noise (-1).

Neighbour search is grid-accelerated for d <= 3 (cells of side eps; only
the 3^d adjacent cells are scanned) and chunked brute-force otherwise —
the paper's own automation protocol is a 20-value eps sweep, so per-run
cost matters. ``dbscan_sweep`` reproduces that protocol: minPts=8,
eps in {0.01..0.2}, best AMI wins.
"""
from __future__ import annotations

import numpy as np

from repro.core.components import UnionFind
from repro.metrics.ami import ami

__all__ = ["dbscan", "dbscan_sweep"]


# Neighbour lists are truncated to this many entries per point. Core
# status uses the *exact* count; the truncated list only feeds border
# attachment and core-core union-find, where overlapping neighbourhoods
# keep dense regions connected regardless (bounds memory to O(n * K)
# instead of O(sum of neighbourhood sizes), which explodes in dense blobs).
_MAX_NEIGHBORS = 64


def _neighbor_lists_grid(X: np.ndarray, eps: float) -> tuple[list[np.ndarray], np.ndarray]:
    """(per-point truncated neighbour arrays, exact counts) via an
    eps-sized grid (d <= 3)."""
    n, d = X.shape
    cells = np.floor(X / eps).astype(np.int64)
    buckets: dict[tuple, np.ndarray] = {}
    order = np.lexsort(cells.T[::-1])
    sorted_cells = cells[order]
    # split contiguous runs of equal cells
    change = np.flatnonzero((np.diff(sorted_cells, axis=0) != 0).any(axis=1)) + 1
    for run in np.split(order, change):
        buckets[tuple(cells[run[0]])] = run
    offsets = np.stack(np.meshgrid(*([[-1, 0, 1]] * d), indexing="ij"), -1).reshape(-1, d)
    eps2 = eps * eps
    out: list[np.ndarray] = [None] * n  # type: ignore[list-item]
    counts = np.zeros(n, dtype=np.int64)
    for cell, members in buckets.items():
        cand_list = []
        for off in offsets:
            b = buckets.get(tuple(np.asarray(cell) + off))
            if b is not None:
                cand_list.append(b)
        cand = np.concatenate(cand_list)
        C = X[cand]
        for i in members:
            d2 = ((C - X[i]) ** 2).sum(axis=1)
            nb = cand[d2 <= eps2]
            counts[i] = nb.size
            out[i] = nb[:_MAX_NEIGHBORS]
    return out, counts


def _neighbor_lists_brute(
    X: np.ndarray, eps: float, chunk: int = 2048
) -> tuple[list[np.ndarray], np.ndarray]:
    n = len(X)
    eps2 = eps * eps
    xx = (X * X).sum(axis=1)
    out: list[np.ndarray] = []
    counts = np.zeros(n, dtype=np.int64)
    for s in range(0, n, chunk):
        block = X[s : s + chunk]
        d2 = xx[s : s + chunk, None] + xx[None, :] - 2.0 * (block @ X.T)
        for j, row in enumerate(d2):
            nb = np.flatnonzero(row <= eps2)
            counts[s + j] = nb.size
            out.append(nb[:_MAX_NEIGHBORS])
    return out, counts


def dbscan(X: np.ndarray, eps: float, min_pts: int) -> np.ndarray:
    """Labels in 0..k-1, noise = -1. Deterministic."""
    X = np.asarray(X, dtype=np.float64)
    n, d = X.shape
    neigh, counts = (
        _neighbor_lists_grid(X, eps) if d <= 3 else _neighbor_lists_brute(X, eps)
    )
    core = counts >= min_pts

    uf = UnionFind(n)
    for i in np.flatnonzero(core):
        for j in neigh[i]:
            if core[j]:
                uf.union(i, int(j))

    labels = np.full(n, -1, dtype=np.int64)
    remap: dict[int, int] = {}
    for i in np.flatnonzero(core):
        r = uf.find(int(i))
        if r not in remap:
            remap[r] = len(remap)
        labels[i] = remap[r]
    # border points: attach to the first core neighbour's cluster
    for i in np.flatnonzero(~core):
        for j in neigh[i]:
            if core[j]:
                labels[i] = labels[j]
                break
    return labels


def dbscan_sweep(
    X: np.ndarray,
    labels_true: np.ndarray,
    *,
    min_pts: int = 8,
    eps_grid: np.ndarray | None = None,
    eval_mask: np.ndarray | None = None,
) -> tuple[np.ndarray, float, float]:
    """The paper's automation: fix minPts, sweep eps, keep the best AMI.

    Returns (best_labels, best_eps, best_ami). ``eval_mask`` restricts the
    AMI computation (the synthetic experiment scores non-noise points
    only).
    """
    if eps_grid is None:
        eps_grid = np.arange(0.01, 0.201, 0.01)
    if eval_mask is None:
        eval_mask = np.ones(len(X), dtype=bool)
    best: tuple[np.ndarray, float, float] | None = None
    for eps in np.sort(np.asarray(eps_grid, dtype=np.float64)):
        lab = dbscan(X, float(eps), min_pts)
        score = ami(labels_true[eval_mask], lab[eval_mask])
        if best is None or score > best[2]:
            best = (lab, float(eps), score)
        # DBSCAN is monotone in eps towards one giant component: once a
        # single cluster swallows nearly everything, larger eps can only
        # make it worse (and each run gets drastically more expensive, as
        # neighbourhood sizes grow with eps^d)
        clustered = lab >= 0
        if clustered.any():
            top = np.bincount(lab[clustered]).max()
            if top >= 0.95 * len(X):
                break
    assert best is not None
    return best
