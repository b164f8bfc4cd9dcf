"""Geometry over cell-based datasets: MBRs, pivots, radii, distances.

All geometry here lives in *grid coordinates* (the integer (X, Y) lattice of
a ``2^theta x 2^theta`` grid): Def. 6 measures dataset distance as Euclidean
distance between cell coordinates, and the connectivity threshold ``delta``
is expressed in the same units (Table II).
"""
from __future__ import annotations

import numpy as np

from .grid import z_decode_np


def cell_coords(cells: np.ndarray, theta: int) -> np.ndarray:
    """(n,) cell IDs -> (n, 2) float array of grid coordinates."""
    X, Y = z_decode_np(np.asarray(cells, dtype=np.int64), theta)
    return np.stack([X, Y], axis=1).astype(np.float64)


def mbr_of_coords(coords: np.ndarray) -> np.ndarray:
    """(n, 2) coords -> MBR [xmin, ymin, xmax, ymax]."""
    return np.array(
        [coords[:, 0].min(), coords[:, 1].min(), coords[:, 0].max(), coords[:, 1].max()]
    )


def mbr_union(a: np.ndarray, b: np.ndarray) -> np.ndarray:
    return np.array([min(a[0], b[0]), min(a[1], b[1]), max(a[2], b[2]), max(a[3], b[3])])


def mbr_intersects(a: np.ndarray, b: np.ndarray) -> bool:
    """Closed-rectangle intersection test (shared edges/corners intersect)."""
    return not (a[2] < b[0] or b[2] < a[0] or a[3] < b[1] or b[3] < a[1])


def pivot_of_mbr(rect: np.ndarray) -> np.ndarray:
    """Def. 12: the pivot is the average of the MBR's two corners."""
    return np.array([(rect[0] + rect[2]) / 2.0, (rect[1] + rect[3]) / 2.0])


def radius_of_mbr(rect: np.ndarray) -> float:
    """Def. 12: half the diagonal of the MBR."""
    return float(np.hypot(rect[2] - rect[0], rect[3] - rect[1]) / 2.0)


def min_cell_distance(a: np.ndarray, b: np.ndarray, chunk: int = 4096) -> float:
    """Exact Def. 6 distance: min Euclidean distance between two coord sets.

    ``a``: (n, 2), ``b``: (m, 2). Chunked broadcasting keeps peak memory at
    ``chunk * m`` floats regardless of n.
    """
    if len(a) == 0 or len(b) == 0:
        return float("inf")
    best = np.inf
    bx, by = b[:, 0], b[:, 1]
    for i in range(0, len(a), chunk):
        part = a[i : i + chunk]
        d2 = (part[:, 0, None] - bx[None, :]) ** 2 + (part[:, 1, None] - by[None, :]) ** 2
        m = d2.min()
        if m < best:
            best = m
            if best == 0.0:
                break
    return float(np.sqrt(best))


def node_distance_bounds(
    o1: np.ndarray, r1: float, o2: np.ndarray, r2: float
) -> tuple[float, float]:
    """Lemma 4 bounds on ``dist(S_Q, S_D)`` from pivots and radii.

    Returns ``(lb, ub)`` with
    ``lb = max(||o1, o2|| - r1 - r2, 0)`` and ``ub = ||o1, o2|| + r1 + r2``.
    """
    d = float(np.hypot(o1[0] - o2[0], o1[1] - o2[1]))
    return max(d - r1 - r2, 0.0), d + r1 + r2
