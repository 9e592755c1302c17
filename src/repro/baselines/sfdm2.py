"""SFDM-2 baseline (Wang, Fabbri, Mathioudakis — ICDE 2022 [50]).

Streaming fair diversity maximization. Maintains, for every threshold mu
in a (1+eps)-geometric grid over [d_min, d_max] (the spread; assumed
known a priori, as in the original), a color-blind GMM instance S^mu
(capacity k) and per-color GMM instances S_j^mu (capacity k_j).
Post-processing scans mu descending and, at separation mu/3, balances
colors by augmenting deficient colors from their per-color instances —
the (1-eps)/(3m+2) guarantee shape.

The grid density |M| = log_{1+eps}(d_max/d_min) is what drives cost:
eps=0.15 gives a dense grid (slow updates, good diversity), eps=0.75 a
sparse one (faster, poor diversity) — the paper's two operating points,
including the log(Delta) dependence MFD's StreamMFD removes.
"""
from __future__ import annotations

import numpy as np

from ..core.geometry import diversity, missed_per_color
from .fairflow import BaselineResult


class SFDM2:
    """Streaming state for SFDM-2. Feed points via :meth:`insert`."""

    def __init__(
        self,
        d: int,
        quotas: np.ndarray,
        *,
        eps: float,
        d_min: float,
        d_max: float,
    ):
        self.quotas = np.asarray(quotas, dtype=np.int64)
        self.m = len(self.quotas)
        self.k = int(self.quotas.sum())
        self.eps = eps
        mus: list[float] = []
        mu = max(d_min, 1e-12)
        while mu <= d_max * (1 + eps):
            mus.append(mu)
            mu *= 1.0 + eps
        self.mus = np.array(mus)
        # Per threshold: global buffer and per-color buffers (numpy stacks).
        self.glob = [np.empty((0, d)) for _ in mus]
        self.glob_colors = [[] for _ in mus]
        self.per_color = [[np.empty((0, d)) for _ in range(self.m)] for _ in mus]
        self.n_seen = 0

    def insert(self, p: np.ndarray, color: int) -> None:
        """One streaming arrival: O(|M| * k) distance work."""
        self.n_seen += 1
        p = np.asarray(p, dtype=np.float64)
        for t, mu in enumerate(self.mus):
            G = self.glob[t]
            if len(G) < self.k and (
                len(G) == 0 or np.sqrt(((G - p) ** 2).sum(axis=1)).min() >= mu
            ):
                self.glob[t] = np.vstack([G, p])
                self.glob_colors[t].append(int(color))
            C = self.per_color[t][color]
            if len(C) < self.quotas[color] + self.k and (
                len(C) == 0 or np.sqrt(((C - p) ** 2).sum(axis=1)).min() >= mu
            ):
                self.per_color[t][color] = np.vstack([C, p])

    def stored_items(self) -> int:
        """Synopsis size (paper: O(m k log Delta))."""
        return sum(len(g) for g in self.glob) + sum(
            len(c) for row in self.per_color for c in row
        )

    def solution(self) -> BaselineResult:
        """Post-processing: largest mu whose balanced set meets all quotas."""
        best_sel, best_colors, best_cover = None, None, -1
        for t in range(len(self.mus) - 1, -1, -1):
            mu = self.mus[t]
            sel_pts: list[np.ndarray] = []
            sel_colors: list[int] = []
            used = np.zeros(self.m, dtype=np.int64)
            # Seed with the color-blind instance, respecting quotas.
            for p, c in zip(self.glob[t], self.glob_colors[t]):
                if used[c] < self.quotas[c]:
                    sel_pts.append(p)
                    sel_colors.append(c)
                    used[c] += 1
            # Augment deficient colors at separation mu/3.
            for j in range(self.m):
                if used[j] >= self.quotas[j]:
                    continue
                for p in self.per_color[t][j]:
                    if used[j] >= self.quotas[j]:
                        break
                    if sel_pts:
                        dmin = min(
                            float(np.sqrt(((q - p) ** 2).sum())) for q in sel_pts
                        )
                        if dmin < mu / 3.0:
                            continue
                    sel_pts.append(p)
                    sel_colors.append(j)
                    used[j] += 1
            cover = int(np.minimum(used, self.quotas).sum())
            if cover > best_cover:
                best_cover = cover
                best_sel, best_colors = list(sel_pts), list(sel_colors)
            if np.all(used >= self.quotas):
                break
        pts = np.array(best_sel) if best_sel else np.empty((0, 1))
        cols = np.array(best_colors, dtype=np.int64) if best_colors else np.empty(0, dtype=np.int64)
        return BaselineResult(
            indices=np.arange(len(pts)),
            diversity=diversity(pts),
            colors=cols,
            missed=missed_per_color(cols, self.quotas),
            extras={"points": pts, "n_thresholds": len(self.mus), "stored": self.stored_items()},
        )


def sfdm2_offline(
    X: np.ndarray,
    colors: np.ndarray,
    quotas: np.ndarray,
    *,
    eps: float,
    d_min: float | None = None,
    d_max: float | None = None,
    seed: int | None = None,
) -> BaselineResult:
    """Run SFDM-2 as an offline baseline by streaming the rows of X once
    (this is how [50]'s algorithm is compared in the offline experiments).
    d_min/d_max default to the paper's protocol: the MFD coreset's min
    nonzero pairwise distance and the global-Gonzalez upper bound."""
    from ..core.coreset import coreset_numpy
    from ..core.geometry import pairwise_distances
    from ..core.mfd import gamma_upper_bound

    X = np.asarray(X, dtype=np.float64)
    colors = np.asarray(colors, dtype=np.int64)
    quotas = np.asarray(quotas, dtype=np.int64)
    if d_min is None or d_max is None:
        sel, _ = coreset_numpy(X, colors, max(int(quotas.max()), 2))
        D = pairwise_distances(X[sel])
        pos = D[D > 0]
        d_min = d_min or float(pos.min()) if len(pos) else 1e-6
        d_max = d_max or float(gamma_upper_bound(X, int(quotas.sum())))
    algo = SFDM2(X.shape[1], quotas, eps=eps, d_min=d_min, d_max=d_max)
    for i in range(len(X)):
        algo.insert(X[i], int(colors[i]))
    return algo.solution()
