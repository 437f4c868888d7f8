"""Tests for the local graph primitives (repro.graph.local)."""
import numpy as np
import pytest

from repro.graph.local import (
    bfs_hops,
    diameter_within,
    mioa_reach,
    undirected_bfs_hops,
)

# A small directed graph: 0->1->2->3, 0->4, 5 isolated-ish (5->0).
SRC = np.array([0, 1, 2, 0, 5])
DST = np.array([1, 2, 3, 4, 0])
N = 6


class TestBfs:
    def test_single_source_levels(self):
        d = bfs_hops(SRC, DST, N, [0])
        assert list(d) == [0, 1, 2, 3, 1, -1]

    def test_multi_source(self):
        d = bfs_hops(SRC, DST, N, [2, 5])
        assert d[2] == 0 and d[5] == 0
        assert d[3] == 1 and d[0] == 1
        assert d[1] == 2

    def test_unreachable_is_minus_one(self):
        d = bfs_hops(SRC, DST, N, [3])
        assert d[0] == -1

    def test_undirected_reaches_back(self):
        d = undirected_bfs_hops(SRC, DST, N, [3])
        assert d[0] == 3 and d[5] == 4

    def test_empty_graph(self):
        d = bfs_hops(np.array([], int), np.array([], int), 3, [1])
        assert list(d) == [-1, 0, -1]


class TestMioa:
    def test_best_path_probability(self):
        # Two routes 0->2: direct 0.3 vs 0.9*0.8 = 0.72 via 1.
        src = np.array([0, 0, 1])
        dst = np.array([2, 1, 2])
        prob = np.array([0.3, 0.9, 0.8])
        p = mioa_reach(src, dst, prob, 3, [0], threshold=0.01)
        assert p[0] == pytest.approx(1.0)
        assert p[1] == pytest.approx(0.9)
        assert p[2] == pytest.approx(0.72)

    def test_threshold_prunes(self):
        src = np.array([0, 1])
        dst = np.array([1, 2])
        prob = np.array([0.1, 0.1])
        p = mioa_reach(src, dst, prob, 3, [0], threshold=0.05)
        assert p[1] == pytest.approx(0.1)
        assert p[2] == 0.0  # 0.01 below threshold

    def test_matches_bruteforce_on_random_graph(self):
        g = np.random.default_rng(0)
        n, m = 8, 20
        src = g.integers(0, n, m)
        dst = g.integers(0, n, m)
        keep = src != dst
        src, dst = src[keep], dst[keep]
        prob = g.uniform(0.2, 0.9, len(src))
        got = mioa_reach(src, dst, prob, n, [0], threshold=1e-6)
        # Floyd-Warshall-style brute force on max path product.
        best = np.zeros((n, n))
        np.fill_diagonal(best, 1.0)
        for a, b, p in zip(src, dst, prob):
            best[a, b] = max(best[a, b], p)
        for _ in range(n):
            for k in range(n):
                best = np.maximum(best, np.outer(best[:, k], best[k, :]))
        assert np.allclose(got, np.where(best[0] >= 1e-6, best[0], 0.0))

    def test_multi_source_takes_best(self):
        src = np.array([0, 1])
        dst = np.array([2, 2])
        prob = np.array([0.2, 0.7])
        p = mioa_reach(src, dst, prob, 3, [0, 1], threshold=0.01)
        assert p[2] == pytest.approx(0.7)


class TestDiameter:
    def test_path_graph(self):
        src = np.array([0, 1, 2])
        dst = np.array([1, 2, 3])
        d = diameter_within(src, dst, 4, np.array([0, 1, 2, 3]), cap=10)
        assert d == 3

    def test_cap_applies(self):
        src = np.array([0, 1, 2])
        dst = np.array([1, 2, 3])
        d = diameter_within(src, dst, 4, np.array([0, 1, 2, 3]), cap=2)
        assert d == 2

    def test_singleton_market(self):
        d = diameter_within(SRC, DST, N, np.array([2]), cap=4)
        assert d == 1

    def test_only_internal_edges_count(self):
        # Members 0 and 3 are connected only through outside nodes.
        d = diameter_within(SRC, DST, N, np.array([0, 3]), cap=5)
        assert d == 1  # disconnected inside -> eccentricity unavailable
