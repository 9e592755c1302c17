"""Dinic max-flow on known graphs."""
import numpy as np
import pytest

from repro.flow.dinic import Dinic


def test_single_edge():
    g = Dinic(2)
    g.add_edge(0, 1, 7)
    assert g.max_flow(0, 1) == 7


def test_series_bottleneck():
    g = Dinic(3)
    g.add_edge(0, 1, 10)
    g.add_edge(1, 2, 4)
    assert g.max_flow(0, 2) == 4


def test_parallel_paths():
    g = Dinic(4)
    g.add_edge(0, 1, 3)
    g.add_edge(0, 2, 5)
    g.add_edge(1, 3, 4)
    g.add_edge(2, 3, 2)
    assert g.max_flow(0, 3) == 5


def test_classic_clrs_graph():
    g = Dinic(6)
    g.add_edge(0, 1, 16)
    g.add_edge(0, 2, 13)
    g.add_edge(1, 2, 10)
    g.add_edge(2, 1, 4)
    g.add_edge(1, 3, 12)
    g.add_edge(3, 2, 9)
    g.add_edge(2, 4, 14)
    g.add_edge(4, 3, 7)
    g.add_edge(3, 5, 20)
    g.add_edge(4, 5, 4)
    assert g.max_flow(0, 5) == 23


def test_disconnected():
    g = Dinic(4)
    g.add_edge(0, 1, 5)
    g.add_edge(2, 3, 5)
    assert g.max_flow(0, 3) == 0


def test_edge_flow_tracking():
    g = Dinic(3)
    e1 = g.add_edge(0, 1, 9)
    e2 = g.add_edge(1, 2, 6)
    assert g.max_flow(0, 2) == 6
    assert g.edge_flow(e1) == 6
    assert g.edge_flow(e2) == 6


@pytest.mark.parametrize("seed", range(5))
def test_bipartite_matching_agrees_with_greedy_bound(seed):
    """Max flow on a random bipartite graph equals maximum matching size,
    checked against a brute-force matching via itertools permutations."""
    rng = np.random.default_rng(seed)
    L, R = 5, 5
    adj = rng.random((L, R)) < 0.4
    g = Dinic(L + R + 2)
    s, t = L + R, L + R + 1
    for i in range(L):
        g.add_edge(s, i, 1)
    for j in range(R):
        g.add_edge(L + j, t, 1)
    for i in range(L):
        for j in range(R):
            if adj[i, j]:
                g.add_edge(i, L + j, 1)
    flow = g.max_flow(s, t)

    # Brute-force maximum matching.
    best = 0
    from itertools import permutations

    for perm in permutations(range(R)):
        size = sum(1 for i in range(L) if adj[i, perm[i]])
        best = max(best, size)
    assert flow == best
