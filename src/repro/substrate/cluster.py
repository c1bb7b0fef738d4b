"""Agglomerative hierarchical clustering — scipy.cluster replacement.

``plot_missing(df)`` renders a dendrogram of columns clustered by nullity
similarity (paper Figure 2, after the Missingno library). scipy is not
installed, so this module implements average-linkage agglomerative
clustering over a distance matrix and emits a scipy-compatible linkage
matrix ``Z`` (rows ``[left, right, dist, size]``).
"""
from __future__ import annotations

import numpy as np

__all__ = ["linkage_average", "cluster_order"]


def linkage_average(dist: np.ndarray) -> np.ndarray:
    """Average-linkage (UPGMA) linkage matrix for an m×m distance matrix.

    Returns ``Z`` of shape (m-1, 4), same encoding as
    ``scipy.cluster.hierarchy.linkage``: clusters 0..m-1 are leaves, cluster
    ``m+i`` is created by row ``i``. Lance–Williams update keeps it O(m³)
    worst case — fine for m = #columns (tens).
    """
    d = np.asarray(dist, dtype="float64").copy()
    m = d.shape[0]
    if d.shape != (m, m):
        raise ValueError(f"distance matrix must be square, got {d.shape}")
    if m < 2:
        return np.zeros((0, 4))
    np.fill_diagonal(d, np.inf)
    # active[i] = current cluster id occupying slot i; sizes per slot
    active = list(range(m))
    size = np.ones(m)
    alive = np.ones(m, dtype=bool)
    Z = np.zeros((m - 1, 4))
    next_id = m
    for step in range(m - 1):
        sub = np.where(alive)[0]
        dd = d[np.ix_(sub, sub)]
        flat = np.argmin(dd)
        i_, j_ = np.unravel_index(flat, dd.shape)
        i, j = sub[i_], sub[j_]
        if i > j:
            i, j = j, i
        dij = d[i, j]
        a, b = active[i], active[j]
        Z[step] = [min(a, b), max(a, b), dij, size[i] + size[j]]
        # Lance–Williams average-linkage update into slot i; kill slot j.
        for k in np.where(alive)[0]:
            if k in (i, j):
                continue
            d[i, k] = d[k, i] = (size[i] * d[i, k] + size[j] * d[j, k]) / (size[i] + size[j])
        size[i] += size[j]
        alive[j] = False
        active[i] = next_id
        next_id += 1
    return Z


def cluster_order(Z: np.ndarray, m: int) -> list[int]:
    """Leaf ordering of the dendrogram (left-to-right), for heatmap sorting."""
    if m == 1:
        return [0]

    children: dict[int, tuple[int, int]] = {
        m + i: (int(Z[i, 0]), int(Z[i, 1])) for i in range(Z.shape[0])
    }

    order: list[int] = []
    stack = [m + Z.shape[0] - 1]
    while stack:
        node = stack.pop()
        if node < m:
            order.append(node)
        else:
            left, right = children[node]
            stack.append(right)
            stack.append(left)
    return order
