"""QFairDiv — range-query fair diversification (Section 5.2, Theorem 5.2).

Index: one KD-tree per color; every tree node stores the Gonzalez
*prefix ordering* of its subtree's points (up to ``k_max``). Because a
Gonzalez prefix is itself a Gonzalez run for every smaller k, a single
stored ordering serves all query budgets.

Query(R, quotas): for each color, decompose R into canonical nodes,
take each node's Gonzalez prefix, and re-run Gonzalez on the union —
the composable k-center argument gives a constant-approximation
k-center solution of P(c_j) ∩ R, hence (Theorem 4.2) the union over
colors is a (1+eps)-coreset of P ∩ R, on which MFD runs.

Substitution note (documented in DESIGN.md): the paper cites the
range-clustering structures of [6, 44] with O(log^{d-1} n) canonical
nodes per query; a KD-tree's rectangle decomposition is O(n^{1-1/d})
worst case but near-polylog on real queries. The query pipeline and the
approximation argument are unchanged.
"""
from __future__ import annotations

import numpy as np

from .geometry import color_counts
from .gonzalez import gonzalez, gonzalez_order
from .kdtree import KDTree
from .mfd import MFDResult, mfd


class QFairDivIndex:
    """Preprocessed structure answering fair-diverse range queries."""

    def __init__(self, X: np.ndarray, colors: np.ndarray, *, k_max: int = 64):
        self.X = np.asarray(X, dtype=np.float64)
        self.colors = np.asarray(colors, dtype=np.int64)
        self.m = int(self.colors.max()) + 1
        self.k_max = int(k_max)
        self.trees: list[KDTree | None] = []
        self.node_orders: list[list[np.ndarray]] = []
        self.color_rows: list[np.ndarray] = []
        for j in range(self.m):
            rows = np.where(self.colors == j)[0]
            self.color_rows.append(rows)
            if len(rows) == 0:
                self.trees.append(None)
                self.node_orders.append([])
                continue
            t = KDTree(self.X[rows])
            self.trees.append(t)
            orders: list[np.ndarray] = []
            for u in range(t.n_nodes):
                pts = t.points_under(u)
                if len(pts) <= 1:
                    orders.append(pts)
                else:
                    o, _ = gonzalez_order(t.X[pts], min(self.k_max, len(pts)))
                    orders.append(pts[o])
            self.node_orders.append(orders)

    def query(
        self,
        lo: np.ndarray,
        hi: np.ndarray,
        quotas: np.ndarray,
        *,
        eps: float = 1.0,
        g: float = 0.3,
        seed: int | None = None,
    ) -> MFDResult:
        """FairDiv on P ∩ [lo, hi]; quotas are clipped to what the range
        contains (Definition 3 constrains only colors present in R)."""
        quotas = np.asarray(quotas, dtype=np.int64)
        k = int(quotas.sum())
        core_rows: list[np.ndarray] = []
        for j in range(self.m):
            t = self.trees[j]
            if t is None:
                continue
            nodes = t.canonical_nodes_rect(lo, hi)
            if not nodes:
                continue
            prefix_rows = np.concatenate(
                [self.node_orders[j][u][: min(self.k_max, k)] for u in nodes]
            )
            cand = t.X[prefix_rows]
            sel = gonzalez(cand, min(k, len(cand)))
            core_rows.append(self.color_rows[j][prefix_rows[sel]])
        if not core_rows:
            empty = np.empty(0, dtype=np.int64)
            return MFDResult(empty, 0.0, float("inf"), empty, quotas.copy(), 0)
        rows = np.concatenate(core_rows)
        Xc, cc = self.X[rows], self.colors[rows]
        eff_quotas = np.minimum(quotas, color_counts(cc, self.m))
        res = mfd(Xc, cc, eff_quotas, eps=eps, g=g, seed=seed)
        res.indices = rows[res.indices]
        res.extras["coreset_size"] = len(rows)
        res.extras["requested_quotas"] = quotas
        return res
