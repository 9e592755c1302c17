"""Small vectorized geometric primitives shared by every module.

All point sets are ``(n, d)`` float64 numpy arrays. Colors are ``(n,)``
integer arrays in ``[0, m)``. These helpers are the single source of
truth for distance semantics (Euclidean, per Definition 1 of the paper).
"""
from __future__ import annotations

import numpy as np


def pairwise_distances(X: np.ndarray, Y: np.ndarray | None = None) -> np.ndarray:
    """Dense Euclidean distance matrix between rows of ``X`` and ``Y``.

    ``Y=None`` means ``Y=X``. Uses the expanded-square identity with a
    clip at 0 to absorb negative round-off before the sqrt.
    """
    X = np.asarray(X, dtype=np.float64)
    Y = X if Y is None else np.asarray(Y, dtype=np.float64)
    sq = (
        (X * X).sum(axis=1)[:, None]
        + (Y * Y).sum(axis=1)[None, :]
        - 2.0 * (X @ Y.T)
    )
    np.clip(sq, 0.0, None, out=sq)
    return np.sqrt(sq)


def dists_to_point(X: np.ndarray, p: np.ndarray) -> np.ndarray:
    """Euclidean distance from every row of ``X`` to the single point ``p``."""
    diff = np.asarray(X, dtype=np.float64) - np.asarray(p, dtype=np.float64)[None, :]
    return np.sqrt((diff * diff).sum(axis=1))


def diversity(X: np.ndarray) -> float:
    """``div(S)``: minimum pairwise Euclidean distance (inf for |S| < 2)."""
    X = np.asarray(X, dtype=np.float64)
    if len(X) < 2:
        return float("inf")
    D = pairwise_distances(X)
    np.fill_diagonal(D, np.inf)
    return float(D.min())


def color_counts(colors: np.ndarray, m: int) -> np.ndarray:
    """Count of points per color id, as an ``(m,)`` int array."""
    return np.bincount(np.asarray(colors, dtype=np.int64), minlength=m)


def satisfies_quotas(colors: np.ndarray, quotas: np.ndarray) -> bool:
    """True iff the multiset ``colors`` contains >= quotas[j] of each color j."""
    quotas = np.asarray(quotas, dtype=np.int64)
    return bool(np.all(color_counts(colors, len(quotas)) >= quotas))


def missed_per_color(colors: np.ndarray, quotas: np.ndarray) -> np.ndarray:
    """Per-color shortfall max(0, k_j - |S(c_j)|) — the Table 4 metric."""
    quotas = np.asarray(quotas, dtype=np.int64)
    return np.maximum(0, quotas - color_counts(colors, len(quotas)))


def bounding_box(X: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """(lo, hi) corners of the axis-aligned bounding box of ``X``."""
    X = np.asarray(X, dtype=np.float64)
    return X.min(axis=0), X.max(axis=0)


def equal_quotas(k: int, m: int) -> np.ndarray:
    """Paper's "equal k_j" split: k_j = k/m, remainder spread over the
    first ``k mod m`` colors so that sum k_j == k exactly."""
    base, rem = divmod(int(k), int(m))
    q = np.full(m, base, dtype=np.int64)
    q[:rem] += 1
    return q


def proportional_quotas(k: int, colors: np.ndarray, m: int) -> np.ndarray:
    """Paper's "proportional k_j": k_j = round(k * |P(c_j)| / n), then
    adjusted (largest-remainder style) so that sum k_j == k exactly."""
    counts = color_counts(colors, m).astype(np.float64)
    ideal = k * counts / counts.sum()
    q = np.floor(ideal).astype(np.int64)
    rem = ideal - q
    short = int(k - q.sum())
    if short > 0:
        q[np.argsort(-rem)[:short]] += 1
    # A quota can never exceed the color's population.
    return np.minimum(q, counts.astype(np.int64))
