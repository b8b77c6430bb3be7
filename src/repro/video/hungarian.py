"""Hungarian algorithm (Kuhn-Munkres) for min-cost assignment.

The SORT family (§6.2) associates detections between consecutive frames
with the Hungarian method; its runtime scales with the object count —
the very property the Object Type Pruner exploits. No scipy in this
container, so this is a from-scratch O(n^3) implementation using the
standard potentials + augmenting-path formulation.
"""
from __future__ import annotations

import numpy as np

__all__ = ["hungarian"]

_INF = 1e18


def hungarian(cost: np.ndarray) -> list[tuple[int, int]]:
    """Solve min-cost assignment on an (n x m) cost matrix.

    Returns a list of (row, col) pairs covering ``min(n, m)`` rows.
    Handles rectangular matrices by assigning each of the smaller side.
    """
    cost = np.asarray(cost, dtype=np.float64)
    if cost.ndim != 2:
        raise ValueError("cost must be 2-D")
    n, m = cost.shape
    if n == 0 or m == 0:
        return []
    transposed = n > m
    a = cost.T if transposed else cost
    n, m = a.shape  # now n <= m

    # Potentials-based Hungarian (1-indexed internals, e-maxx formulation).
    u = np.zeros(n + 1)
    v = np.zeros(m + 1)
    p = np.zeros(m + 1, dtype=np.int64)  # p[j] = row matched to column j
    way = np.zeros(m + 1, dtype=np.int64)
    for i in range(1, n + 1):
        p[0] = i
        j0 = 0
        minv = np.full(m + 1, _INF)
        used = np.zeros(m + 1, dtype=bool)
        while True:
            used[j0] = True
            i0, delta, j1 = p[j0], _INF, 0
            for j in range(1, m + 1):
                if not used[j]:
                    cur = a[i0 - 1, j - 1] - u[i0] - v[j]
                    if cur < minv[j]:
                        minv[j] = cur
                        way[j] = j0
                    if minv[j] < delta:
                        delta = minv[j]
                        j1 = j
            for j in range(m + 1):
                if used[j]:
                    u[p[j]] += delta
                    v[j] -= delta
                else:
                    minv[j] -= delta
            j0 = j1
            if p[j0] == 0:
                break
        while j0:
            j1 = way[j0]
            p[j0] = p[j1]
            j0 = j1

    pairs = [(int(p[j]) - 1, j - 1) for j in range(1, m + 1) if p[j] != 0]
    if transposed:
        pairs = [(c, r) for r, c in pairs]
    return sorted(pairs)
