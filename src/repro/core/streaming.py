"""StreamMFD — the paper's streaming algorithm (Section 5.1, Theorem 5.1).

Per color, a doubling-algorithm instance (Charikar et al. [23]) maintains
a constant-approximation k-center synopsis of everything seen so far:
O(k) items stored, O(k) distance work per update (the paper quotes
O(k log k) via a dynamic closest-pair structure; a vectorized linear scan
is faster in practice at these k). By Lemma 4.1/Theorem 4.2 the union of
the per-color synopses is a (1+eps)-coreset of the stream, so
post-processing = MFD on O(mk) points: O(m k^2 log^3 k), independent of
the spread Delta — the paper's headline improvement over SFDM-2 [50].
"""
from __future__ import annotations

import numpy as np

from .geometry import dists_to_point
from .mfd import MFDResult, mfd


class DoublingKCenter:
    """Incremental k-center with the doubling algorithm.

    Invariant sketch: centers are pairwise > tau and every point seen is
    within c*tau of some center; on overflow tau doubles and centers are
    greedily pruned. Constant-factor (8-approx) vs the offline optimum.
    """

    def __init__(self, k: int, d: int):
        self.k = int(k)
        self.tau = 0.0
        self.C = np.empty((0, d))

    def insert(self, p: np.ndarray) -> None:
        p = np.asarray(p, dtype=np.float64)
        if len(self.C) < self.k:
            self.C = np.vstack([self.C, p])
            if len(self.C) == self.k and self.k >= 2:
                from .geometry import pairwise_distances

                D = pairwise_distances(self.C)
                np.fill_diagonal(D, np.inf)
                self.tau = float(D.min())
            return
        if dists_to_point(self.C, p).min() > self.tau:
            self.C = np.vstack([self.C, p])
            while len(self.C) > self.k:
                self.tau = max(self.tau * 2.0, 1e-300)
                self.C = self._prune(self.C, self.tau)

    @staticmethod
    def _prune(C: np.ndarray, tau: float) -> np.ndarray:
        keep: list[int] = []
        for i in range(len(C)):
            if not keep or dists_to_point(C[keep], C[i]).min() > tau:
                keep.append(i)
        return C[keep]

    @property
    def centers(self) -> np.ndarray:
        return self.C


class StreamMFD:
    """SFairDiv solver: per-color doubling synopses + MFD post-processing."""

    def __init__(self, d: int, m: int, per_color_k: int):
        self.m = int(m)
        self.instances = [DoublingKCenter(per_color_k, d) for _ in range(m)]
        self.n_seen = 0

    def insert(self, p: np.ndarray, color: int) -> None:
        """O(k) update (Theorem 5.1)."""
        self.n_seen += 1
        self.instances[int(color)].insert(p)

    def stored_items(self) -> int:
        """Synopsis size: O(m k), independent of the spread."""
        return sum(len(inst.C) for inst in self.instances)

    def synopsis(self) -> tuple[np.ndarray, np.ndarray]:
        """The maintained coreset as (X, colors) arrays."""
        Xs, cs = [], []
        for j, inst in enumerate(self.instances):
            Xs.append(inst.centers)
            cs.append(np.full(len(inst.centers), j, dtype=np.int64))
        return np.concatenate(Xs, axis=0), np.concatenate(cs)

    def solution(
        self,
        quotas: np.ndarray,
        *,
        eps: float = 1.0,
        g: float = 0.3,
        seed: int | None = None,
    ) -> MFDResult:
        """Post-processing: run MFD on the synopsis (O(m k^2 log^3 k))."""
        Xc, cc = self.synopsis()
        quotas = np.minimum(
            np.asarray(quotas, dtype=np.int64),
            np.bincount(cc, minlength=self.m),
        )
        res = mfd(Xc, cc, quotas, eps=eps, g=g, seed=seed)
        res.extras["synopsis_points"] = Xc[res.indices]
        return res


def stream_partitioned_synopsis(df, per_color_k: int, *, color_col: str = "color"):
    """Distributed variant: each Spark partition runs its own per-color
    doubling synopsis over its slice of the stream, and the partial
    synopses are merged on the driver by a final per-color Gonzalez —
    the composable-coreset argument (Theorem 4.2) again. Returns
    (X, colors) of the merged O(mk) synopsis."""
    import pandas as pd

    from .coreset import feature_columns
    from .gonzalez import gonzalez

    feats = feature_columns(df)
    m_holder = df.selectExpr(f"max({color_col}) as mx").collect()[0].mx + 1
    schema = df.select(*feats, color_col).schema

    def per_partition(batches):
        for pdf in batches:
            X = pdf[feats].to_numpy(dtype=np.float64)
            colors = pdf[color_col].to_numpy(dtype=np.int64)
            sm = StreamMFD(X.shape[1], m_holder, per_color_k)
            for i in range(len(X)):
                sm.insert(X[i], int(colors[i]))
            Xs, cs = sm.synopsis()
            out = pd.DataFrame(Xs, columns=feats)
            out[color_col] = cs
            yield out

    partial = df.select(*feats, color_col).mapInPandas(per_partition, schema=schema)
    pdf = partial.toPandas()
    X = pdf[feats].to_numpy(dtype=np.float64)
    colors = pdf[color_col].to_numpy(dtype=np.int64)
    out_idx = []
    for j in np.unique(colors):
        idx = np.where(colors == j)[0]
        out_idx.append(idx[gonzalez(X[idx], per_color_k)])
    sel = np.concatenate(out_idx)
    return X[sel], colors[sel]
