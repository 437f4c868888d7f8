"""PS [20] — maximum-influence-path seed estimation with discounting.

Teng et al.'s multi-grade product approach estimates each candidate
seed's influence *alone* through maximum influence paths (MIA-style)
and discounts candidates whose influence region is already covered by
selected seeds. As the paper notes, "it only estimates the influence
of a seed alone and cannot utilize the impact of items from other
promotions" — no item relationships, no dynamics.

score(u, x) = w_x · p̄ref(x) · Σ_v p_path(u→v) · (1 − cov_x(v)),

where ``p_path`` is the best path probability over the initial
influence strengths, ``p̄ref(x)`` is the *population-mean* preference
(PS estimates a seed's influence alone and does not target individual
user-item matches), and ``cov_x`` is the probability that ``v`` is
already influenced for ``x`` by previously selected seeds. Greedy by
score per cost within the budget; CR-Greedy timings.
"""
from __future__ import annotations

import numpy as np

from repro.baselines.cr_greedy import cr_greedy_timings
from repro.dynamics.state import ModelData
from repro.graph.local import mioa_reach


def ps(
    model: ModelData, budget: float, T: int, *, max_seeds: int | None = None
) -> list[tuple[int, int, int]]:
    """Path-based greedy pair selection, then CR-Greedy scheduling."""
    p = model.params
    cand_users = [int(u) for u in np.argsort(-model.out_deg)[: p.cand_users]]
    act0 = np.clip(model.base_inf, p.act_floor, p.act_cap)
    mean_pref = np.clip(model.base_pref, p.pref_floor, 1.0).mean(axis=0)  # [I]

    # Maximum-influence-path probabilities from every candidate user
    # (the expensive search the paper attributes PS's run time to).
    reach = {
        u: mioa_reach(model.src, model.dst, act0, model.n_users, [u], p.theta_mioa)
        for u in cand_users
    }
    cov = np.zeros((model.n_users, model.n_items))  # cov_x(v)

    selected: list[tuple[int, int]] = []
    spent = 0.0
    limit = max_seeds if max_seeds is not None else len(cand_users) * model.n_items
    while len(selected) < limit:
        best = None
        taken = set(selected)
        for u in cand_users:
            r = reach[u]
            # self-adoption + discounted path coverage, population-mean pref
            base = r[:, None] * (1.0 - cov)  # [U, I]
            scores = model.importance * (1.0 + mean_pref * base.sum(axis=0))
            for x in range(model.n_items):
                if (u, x) in taken:
                    continue
                c = float(model.cost[u, x])
                if spent + c > budget:
                    continue
                key = (scores[x] / c, -u, -x)
                if best is None or key > best[0]:
                    best = (key, u, x, c)
        if best is None:
            break
        _, u, x, c = best
        selected.append((u, x))
        spent += c
        cov[:, x] = 1.0 - (1.0 - cov[:, x]) * (1.0 - reach[u])
    return cr_greedy_timings(model, selected, T)
