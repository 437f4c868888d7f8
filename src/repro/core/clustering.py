"""TMI phases 2–3 — target markets, common-user groups, AE ordering.

Sec. IV-B: nominees are clustered by social closeness and item
relationship (larger average complementary, smaller substitutable
relevance encouraged: link score ``r̄^C − r̄^S ≥ 0``); each cluster's
target market is the MIOA influence region of its nominees; markets
sharing ≥ θ users form a set 𝒢, promoted in ascending Antagonistic
Extent ``AE(τ_i) = Σ_{x∈τ_i, y∈τ_j, j≠i} r̄^S_{x,y}``.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.dynamics.state import ModelData, init_state
from repro.graph.local import diameter_within, mioa_reach, undirected_bfs_hops
from repro.kg.relevance import average_relevance


@dataclass
class TargetMarket:
    """A cluster of nominees plus the users they can influence."""

    nominees: list[tuple[int, int]]
    users: np.ndarray
    diameter: int
    items: list[int] = field(init=False)

    def __post_init__(self) -> None:
        self.items = sorted({x for _, x in self.nominees})


class _UnionFind:
    def __init__(self, n: int) -> None:
        self.p = list(range(n))

    def find(self, a: int) -> int:
        while self.p[a] != a:
            self.p[a] = self.p[self.p[a]]
            a = self.p[a]
        return a

    def union(self, a: int, b: int) -> None:
        ra, rb = self.find(a), self.find(b)
        if ra != rb:
            self.p[max(ra, rb)] = min(ra, rb)


def initial_average_relevance(model: ModelData) -> tuple[np.ndarray, np.ndarray]:
    """Population-average ``(r̄^C, r̄^S)`` at the initial perceptions."""
    st = init_state(model, 1)
    return (
        average_relevance(st.wc, model.s_c),
        average_relevance(st.ws, model.s_s),
    )


def identify_target_markets(
    model: ModelData,
    nominees: list[tuple[int, int]],
    r_bar_c: np.ndarray,
    r_bar_s: np.ndarray,
) -> list[TargetMarket]:
    """Cluster nominees and grow each cluster's influence region.

    Two nominees are linked when their users are within ``link_hops``
    (undirected social distance) *and* their items are complementary on
    balance (``r̄^C − r̄^S ≥ 0``, or the same item). The market's users
    are the MIOA region (path probability ≥ ``theta_mioa`` on the
    initial influence strengths) of the cluster's nominee users.
    """
    if not nominees:
        return []
    p = model.params
    n = len(nominees)
    # Social distance from each nominee user (undirected BFS each).
    hop_rows = {}
    for u in sorted({u for u, _ in nominees}):
        hop_rows[u] = undirected_bfs_hops(model.src, model.dst, model.n_users, [u])

    # Capacity-capped leader clustering (stands in for POT/FGCC, which
    # likewise produce several clusters): nominees join the first
    # cluster whose leader is socially close and whose items are
    # complementary on balance; cluster size is capped so the campaign
    # yields multiple markets promoted in sequence — the paper's
    # "intensively promoting a few items within a short period" per
    # market. Processing follows nominee selection order.
    cap = max(2, -(-n // 3))  # ceil(n / 3), at least 2
    clusters: dict[int, list[int]] = {}
    leaders: list[int] = []
    for i in range(n):
        ui, xi = nominees[i]
        placed = False
        for li in leaders:
            if len(clusters[li]) >= cap:
                continue
            ul, xl = nominees[li]
            d = hop_rows[ul][ui]
            if d < 0 or d > p.link_hops:
                continue
            if xi == xl or (r_bar_c[xi, xl] - r_bar_s[xi, xl]) >= 0:
                clusters[li].append(i)
                placed = True
                break
        if not placed:
            leaders.append(i)
            clusters[i] = [i]

    act0 = np.clip(model.base_inf, p.act_floor, p.act_cap)
    markets = []
    for root in sorted(clusters):
        mem = [nominees[i] for i in clusters[root]]
        srcs = sorted({u for u, _ in mem})
        reach = mioa_reach(
            model.src, model.dst, act0, model.n_users, srcs, p.theta_mioa
        )
        users = np.flatnonzero(reach > 0)
        if len(users) > p.market_cap:
            # Keep the most-reachable members; planning cost is bounded
            # by the market size (the full network is still used for
            # the final sigma evaluation).
            top = users[np.argsort(-reach[users], kind="stable")[: p.market_cap]]
            users = np.sort(top)
        users = np.union1d(users, np.asarray(srcs, dtype=np.int64))
        diam = diameter_within(model.src, model.dst, model.n_users, users, p.d_cap)
        markets.append(TargetMarket(nominees=mem, users=users, diameter=diam))
    return markets


def antagonistic_extent(
    markets: list[TargetMarket], group: list[int], r_bar_s: np.ndarray
) -> dict[int, float]:
    """``AE(τ_i)`` within one 𝒢: substitutable relevance of τ_i's items
    against the items of the *other* markets in the group."""
    ae: dict[int, float] = {}
    for i in group:
        total = 0.0
        for j in group:
            if j == i:
                continue
            for x in markets[i].items:
                for y in markets[j].items:
                    total += float(r_bar_s[x, y])
        ae[i] = total
    return ae


def group_and_order(
    markets: list[TargetMarket], theta: int, r_bar_s: np.ndarray
) -> list[list[int]]:
    """Partition markets into 𝒢s by ≥θ common users; order by AE.

    Returns groups (lists of market indices); within a group, ascending
    AE (the least-antagonistic market is promoted first); groups
    themselves are ordered by total nominee count descending so big
    markets are planned first.
    """
    n = len(markets)
    uf = _UnionFind(n)
    for i in range(n):
        for j in range(i + 1, n):
            common = len(np.intersect1d(markets[i].users, markets[j].users))
            if common >= theta:
                uf.union(i, j)
    groups: dict[int, list[int]] = {}
    for i in range(n):
        groups.setdefault(uf.find(i), []).append(i)
    ordered = []
    for root in groups:
        g = groups[root]
        ae = antagonistic_extent(markets, g, r_bar_s)
        g_sorted = sorted(g, key=lambda i: (ae[i], i))
        ordered.append(g_sorted)
    ordered.sort(key=lambda g: (-sum(len(markets[i].nominees) for i in g), g[0]))
    return ordered
