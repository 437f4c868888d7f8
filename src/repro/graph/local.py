"""Local (numpy/BFS) graph primitives used by Dysim's planner.

All functions take the edge arrays of a :class:`~repro.dynamics.state.
ModelData` (or raw ``src``/``dst`` arrays) and are deterministic.
"""
from __future__ import annotations

import heapq
from collections import deque

import numpy as np


def _adj(src: np.ndarray, dst: np.ndarray, n: int, undirected: bool) -> list[list[int]]:
    adj: list[list[int]] = [[] for _ in range(n)]
    for a, b in zip(src.tolist(), dst.tolist()):
        adj[a].append(b)
        if undirected:
            adj[b].append(a)
    return adj


def bfs_hops(
    src: np.ndarray, dst: np.ndarray, n: int, sources, *, undirected: bool = False
) -> np.ndarray:
    """Multi-source BFS hop counts; unreachable nodes get -1."""
    adj = _adj(src, dst, n, undirected)
    dist = np.full(n, -1, dtype=np.int64)
    dq: deque[int] = deque()
    for s in sources:
        if dist[s] < 0:
            dist[s] = 0
            dq.append(int(s))
    while dq:
        u = dq.popleft()
        for v in adj[u]:
            if dist[v] < 0:
                dist[v] = dist[u] + 1
                dq.append(v)
    return dist


def undirected_bfs_hops(src, dst, n, sources) -> np.ndarray:
    """Social distance: BFS treating friendship edges as undirected."""
    return bfs_hops(src, dst, n, sources, undirected=True)


def mioa_reach(
    src: np.ndarray,
    dst: np.ndarray,
    prob: np.ndarray,
    n: int,
    sources,
    threshold: float,
) -> np.ndarray:
    """Maximum-influence out-arborescence reachable set (MIOA [22]).

    Dijkstra on edge lengths ``-log(prob)`` from the given sources; a
    node belongs to the influence region if its best path probability
    is ≥ ``threshold``. Returns the best path probability per node
    (0 where below threshold or unreachable); sources get 1.
    """
    adj: list[list[tuple[int, float]]] = [[] for _ in range(n)]
    lens = -np.log(np.clip(prob, 1e-12, 1.0))
    for a, b, w in zip(src.tolist(), dst.tolist(), lens.tolist()):
        adj[a].append((b, w))
    limit = -np.log(max(threshold, 1e-12))
    dist = np.full(n, np.inf)
    heap: list[tuple[float, int]] = []
    for s in sources:
        if dist[s] > 0:
            dist[s] = 0.0
            heapq.heappush(heap, (0.0, int(s)))
    while heap:
        d, u = heapq.heappop(heap)
        if d > dist[u]:
            continue
        for v, w in adj[u]:
            nd = d + w
            if nd < dist[v] and nd <= limit:
                dist[v] = nd
                heapq.heappush(heap, (nd, v))
    p = np.exp(-dist)
    p[~np.isfinite(dist)] = 0.0
    p[p < threshold] = 0.0
    return p


def diameter_within(
    src: np.ndarray, dst: np.ndarray, n: int, members: np.ndarray, cap: int
) -> int:
    """Approximate diameter of the subgraph induced by ``members``.

    Max undirected BFS eccentricity from up to 4 probe members (exact
    on the probes; capped at ``cap``, the paper's PI/RI recursion depth
    is likewise bounded by the market diameter). At least 1.
    """
    members = np.asarray(members, dtype=np.int64)
    if len(members) <= 1:
        return 1
    mask = np.zeros(n, dtype=bool)
    mask[members] = True
    keep = mask[src] & mask[dst]
    s, d = src[keep], dst[keep]
    best = 1
    for probe in members[: min(4, len(members))]:
        dist = bfs_hops(s, d, n, [int(probe)], undirected=True)
        dd = dist[members]
        if (dd >= 0).any():
            best = max(best, int(dd.max()))
        if best >= cap:
            return cap
    return max(1, min(best, cap))
