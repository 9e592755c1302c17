"""FairFlow baseline (Moumoulidou, McGregor, Meliou — ICDT 2021 [41]).

Reimplemented from the paper's description (the original artifact uses
networkx, unavailable offline): per-color Gonzalez candidates, a greedy
net over the candidate union, and a max-flow assignment of colors to
net clusters. Guarantee shape 1/(3m-1): in the paper's experiments this
is the *fastest* algorithm but returns sets with much lower diversity
than MFD — exactly the trade our implementation preserves.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from ..core.geometry import diversity, missed_per_color, pairwise_distances
from ..core.gonzalez import gonzalez
from ..flow.dinic import Dinic


@dataclass
class BaselineResult:
    indices: np.ndarray
    diversity: float
    colors: np.ndarray
    missed: np.ndarray
    extras: dict


def _greedy_net(X: np.ndarray, sep: float) -> np.ndarray:
    """Greedy net: scan points; keep those >= sep from all kept. Every
    point ends within sep of some kept center (standard net property)."""
    centers: list[int] = []
    C = np.empty((0, X.shape[1]))
    for i in range(len(X)):
        if len(centers) == 0 or np.sqrt(((C - X[i]) ** 2).sum(axis=1)).min() >= sep:
            centers.append(i)
            C = np.vstack([C, X[i]])
    return np.array(centers, dtype=np.int64)


def _flow_select(
    U: np.ndarray,
    u_colors: np.ndarray,
    clusters: np.ndarray,
    centers: np.ndarray,
    quotas: np.ndarray,
) -> list[int]:
    """Max-flow: source -> color (cap k_j) -> cluster (cap 1 per pair)
    -> sink (cap 1). Returns selected candidate indices (into U rows)."""
    m = len(quotas)
    ncl = len(centers)
    s, t = m + ncl, m + ncl + 1
    g = Dinic(m + ncl + 2)
    for j in range(m):
        g.add_edge(s, j, int(quotas[j]))
    for l in range(ncl):
        g.add_edge(m + l, t, 1)
    pair_edges: dict[tuple[int, int], int] = {}
    for j in range(m):
        for l in np.unique(clusters[u_colors == j]):
            pair_edges[(j, int(l))] = g.add_edge(j, m + int(l), 1)
    g.max_flow(s, t)
    sel: list[int] = []
    for (j, l), eid in pair_edges.items():
        if g.edge_flow(eid) == 1:
            # Prefer the cluster center itself when colors match; else the
            # member of color j nearest to the center.
            members = np.where((clusters == l) & (u_colors == j))[0]
            if centers[l] in members:
                sel.append(int(centers[l]))
            else:
                d = np.sqrt(((U[members] - U[centers[l]]) ** 2).sum(axis=1))
                sel.append(int(members[np.argmin(d)]))
    return sel


def fairflow(
    X: np.ndarray, colors: np.ndarray, quotas: np.ndarray, *, seed: int | None = None
) -> BaselineResult:
    """Run FairFlow on (X, colors) with per-color quotas."""
    X = np.asarray(X, dtype=np.float64)
    colors = np.asarray(colors, dtype=np.int64)
    quotas = np.asarray(quotas, dtype=np.int64)
    m = len(quotas)
    k = int(quotas.sum())
    # Per-color Gonzalez candidates (the O(nk) stage).
    cand: list[np.ndarray] = []
    for j in range(m):
        idx = np.where(colors == j)[0]
        cand.append(idx[gonzalez(X[idx], max(int(quotas[j]), min(k, len(idx))))])
    cand_idx = np.concatenate(cand)
    U, u_colors = X[cand_idx], colors[cand_idx]
    # Unfair-diversity estimate from color-blind Gonzalez on the union.
    delta = diversity(U[gonzalez(U, min(k, len(U)))])
    if not np.isfinite(delta):
        delta = 1.0
    sep = delta / (3 * m - 1)
    centers = _greedy_net(U, sep)
    D = pairwise_distances(U, U[centers])
    clusters = np.argmin(D, axis=1)
    sel_rows = _flow_select(U, u_colors, clusters, centers, quotas)
    sel = cand_idx[sel_rows]
    return BaselineResult(
        indices=sel,
        diversity=diversity(X[sel]),
        colors=colors[sel],
        missed=missed_per_color(colors[sel], quotas),
        extras={"sep": sep, "n_clusters": len(centers)},
    )
