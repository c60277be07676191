"""Exact one-dimensional order-k Voronoi diagram over the task timeline.

The solution space of k-NN searching over ``m`` slots with executed-slot
sites is a 1-D order-k Voronoi diagram (Section III-C): the timeline splits
into maximal intervals (cells) whose slots share the same k-NN *set* of
executed slots.  This module computes the exact diagram by brute force — it
is the ground truth for testing the tree index's stopping condition
(Lemma 8) and the locality arguments.
"""
from __future__ import annotations

import numpy as np

from repro.core.quality import knn_distances


def knn_set(exec_sorted: np.ndarray, m: int, k: int, slot: int) -> frozenset[int]:
    """The set of executed slots forming ``slot``'s k-NN (ties broken toward
    the earlier executed slot, matching :func:`knn_distances`)."""
    _, idx = knn_distances(
        np.asarray(exec_sorted, np.int64), m, k, np.asarray([slot], np.int64)
    )
    real = idx[0][idx[0] >= 0]
    return frozenset(int(exec_sorted[i]) for i in real)


def order_k_cells(
    exec_sorted: np.ndarray, m: int, k: int
) -> list[tuple[int, int, frozenset[int]]]:
    """All order-k Voronoi cells as ``(l, r, knn_set)`` with l..r inclusive."""
    exec_sorted = np.asarray(exec_sorted, np.int64)
    cells: list[tuple[int, int, frozenset[int]]] = []
    cur_set: frozenset[int] | None = None
    start = 0
    for s in range(m):
        ks = knn_set(exec_sorted, m, k, s)
        if cur_set is None:
            cur_set, start = ks, s
        elif ks != cur_set:
            cells.append((start, s - 1, cur_set))
            cur_set, start = ks, s
    if cur_set is not None:
        cells.append((start, m - 1, cur_set))
    return cells
