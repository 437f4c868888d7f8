"""BundleGRD [33] — greedy user selection for a fixed item bundle.

Banerjee et al.'s utility-driven welfare maximization promotes a
*bundle* of desired items; the greedy picks users, each of whom is
seeded with the whole bundle. As the paper notes, this neglects the
substitutable relationship ("regards all items as a bundle") and
"allocates the budget to the same users to promote a bundle of
complementary items" — seeding one user costs the sum of the per-item
costs, so few users are reached at a given budget.

Bundle = the top items by importance (capped so a bundle is affordable
at the experimental budgets; the paper's target sets are likewise small
relative to the catalogue). Timings: CR-Greedy per user, the user's
whole bundle at one round (a bundle is promoted together).
"""
from __future__ import annotations

import heapq

import numpy as np

from repro.baselines.cr_greedy import cr_greedy_timings
from repro.core.nominees import _f
from repro.dynamics.state import ModelData


def bundlegrd(
    model: ModelData,
    budget: float,
    T: int,
    *,
    bundle_size: int = 4,
) -> list[tuple[int, int, int]]:
    """Greedy (lazy) user selection for the importance-top bundle."""
    p = model.params
    bundle = [int(x) for x in np.argsort(-model.importance)[:bundle_size]]
    cand_users = [int(u) for u in np.argsort(-model.out_deg)[: p.cand_users]]

    def user_cost(u: int) -> float:
        return float(sum(model.cost[u, x] for x in bundle))

    selected_users: list[int] = []
    spent = 0.0
    f_sel = 0.0

    def f_of(users: list[int]) -> float:
        return _f(
            model, [(u, x) for u in users for x in bundle], p.mc_plan, frozen=True
        )

    heap: list[tuple[float, int, int]] = []
    for u in cand_users:
        if user_cost(u) > budget:
            continue
        gain = f_of([u])
        heapq.heappush(heap, (-gain / user_cost(u), u, 0))
    while heap:
        neg, u, at = heapq.heappop(heap)
        c = user_cost(u)
        if spent + c > budget:
            continue
        if at < len(selected_users):
            f_new = f_of(selected_users + [u])
            heapq.heappush(heap, (-(f_new - f_sel) / c, u, len(selected_users)))
            continue
        f_sel = f_of(selected_users + [u])
        selected_users.append(u)
        spent += c

    groups = [[(u, x) for x in bundle] for u in selected_users]
    pairs = [pr for g in groups for pr in g]
    return cr_greedy_timings(model, pairs, T, groups=groups)
