"""FMMD-S baseline (Wang, Mathioudakis, Li, Fabbri — SDM 2023 [52]).

Shape of the original: build a small candidate set (coreset), then for
decreasing diversity thresholds solve an *exact* integer program —
"pick an independent set of the threshold conflict graph with >= k_j
candidates per color" — returning the first feasible threshold's
solution. The original solves the IP with Gurobi; offline we implement
an exact backtracking search over conflict bitmasks with a node budget.
Budget exhaustion raises :class:`FMMDSBudgetExceeded`, which the
experiment harness records as DNF — reproducing the paper's observation
that FMMD-S attains the best diversity on small instances but fails to
finish (30-min timeout) on the large ones.
"""
from __future__ import annotations

import numpy as np

from ..core.geometry import diversity, missed_per_color, pairwise_distances
from ..core.gonzalez import gonzalez
from .fairflow import BaselineResult


class FMMDSBudgetExceeded(RuntimeError):
    """Raised when the exact search exceeds its node budget (DNF)."""


def _exact_quota_independent_set(
    adj: list[int],
    colors: np.ndarray,
    quotas: np.ndarray,
    budget: list[int],
) -> list[int] | None:
    """Exact search: choose >= k_j mutually non-adjacent vertices per color.

    ``adj[i]`` is a conflict bitmask. Colors are processed in scarcity
    order; within a color, candidates are chosen by depth-first search
    with pruning on remaining-supply counts. ``budget`` is a single-cell
    mutable countdown shared across the recursion.
    """
    m = len(quotas)
    order = sorted(
        range(m), key=lambda j: (int((colors == j).sum()) - int(quotas[j]))
    )
    full_mask = (1 << len(adj)) - 1
    by_color = [np.where(colors == j)[0].tolist() for j in range(m)]

    def rec(ci: int, allowed: int, chosen: list[int]) -> list[int] | None:
        budget[0] -= 1
        if budget[0] <= 0:
            raise FMMDSBudgetExceeded
        if ci == m:
            return chosen
        j = order[ci]
        need = int(quotas[j])
        cands = [v for v in by_color[j] if (allowed >> v) & 1]
        if len(cands) < need:
            return None

        def pick(start: int, left: int, cur_allowed: int, cur: list[int]):
            budget[0] -= 1
            if budget[0] <= 0:
                raise FMMDSBudgetExceeded
            if left == 0:
                return rec(ci + 1, cur_allowed, cur)
            avail = [p for p in range(start, len(cands)) if (cur_allowed >> cands[p]) & 1]
            if len(avail) < left:
                return None
            for pos in avail:
                v = cands[pos]
                res = pick(
                    pos + 1,
                    left - 1,
                    cur_allowed & ~adj[v] & ~(1 << v),
                    cur + [v],
                )
                if res is not None:
                    return res
            return None

        return pick(0, need, allowed, chosen)

    return rec(0, full_mask, [])


def fmmds(
    X: np.ndarray,
    colors: np.ndarray,
    quotas: np.ndarray,
    *,
    node_budget: int = 300_000,
    seed: int | None = None,
) -> BaselineResult:
    """Run FMMD-S on (X, colors): exact threshold search over a candidate set.

    Raises :class:`FMMDSBudgetExceeded` when the exact IP search blows the
    node budget (recorded as DNF by the harness).
    """
    X = np.asarray(X, dtype=np.float64)
    colors = np.asarray(colors, dtype=np.int64)
    quotas = np.asarray(quotas, dtype=np.int64)
    m = len(quotas)
    k = int(quotas.sum())
    # Candidate set: color-blind Gonzalez k plus per-color Gonzalez k_j
    # (guarantees every color has enough candidates).
    cand = [gonzalez(X, min(k, len(X)))]
    for j in range(m):
        idx = np.where(colors == j)[0]
        cand.append(idx[gonzalez(X[idx], int(quotas[j]) * 2)])
    cand_idx = np.unique(np.concatenate(cand))
    U, u_colors = X[cand_idx], colors[cand_idx]
    D = pairwise_distances(U)
    np.fill_diagonal(D, np.inf)
    thresholds = np.unique(D[np.isfinite(D)])[::-1]  # descending
    budget = [node_budget]

    def feasible(gamma: float) -> list[int] | None:
        conflict = D < gamma
        adj = []
        for i in range(len(U)):
            mask = 0
            for v in np.where(conflict[i])[0]:
                mask |= 1 << int(v)
            adj.append(mask)
        return _exact_quota_independent_set(adj, u_colors, quotas, budget)

    # thresholds is descending, so feasibility is monotone in the index
    # (larger index = smaller gamma = fewer conflicts). Binary-search the
    # first feasible index, i.e. the largest feasible gamma.
    lo, hi = 0, len(thresholds) - 1
    best_sel, best_gamma = None, 0.0
    while lo <= hi:
        mid = (lo + hi) // 2
        sol = feasible(float(thresholds[mid]))
        if sol is not None:
            best_sel, best_gamma = sol, float(thresholds[mid])
            hi = mid - 1
        else:
            lo = mid + 1
    if best_sel is None:
        sel = np.empty(0, dtype=np.int64)
    else:
        sel = cand_idx[np.array(best_sel, dtype=np.int64)]
    return BaselineResult(
        indices=sel,
        diversity=diversity(X[sel]),
        colors=colors[sel],
        missed=missed_per_color(colors[sel], quotas),
        extras={"gamma": best_gamma, "n_candidates": len(U), "budget_left": budget[0]},
    )
