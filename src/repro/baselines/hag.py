"""HAG [10] — greedy user-item pair selection with item inference.

Hung et al.'s approach greedily selects the most influential
combination of user-item pairs (it is aware of item associations —
our frozen engine includes ``P_ext`` — but not of the *dynamics* of
perceptions, preferences, or influence strength). Extended per the
paper: per-pair costs against the budget and CR-Greedy timings.

The pair-selection greedy coincides with TMI's MCP/CELF machinery
(both are cost-aware lazy greedy over frozen influence), so it is
reused — the difference between HAG and Dysim is everything *after*
selection: target markets, DRE item ordering, and SI timings.
"""
from __future__ import annotations

from repro.baselines.cr_greedy import cr_greedy_timings
from repro.core.nominees import select_nominees
from repro.dynamics.state import ModelData


def hag(
    model: ModelData, budget: float, T: int, *, max_pairs: int = 150
) -> list[tuple[int, int, int]]:
    """Select pairs by cost-aware frozen greedy; schedule with CR-Greedy."""
    pairs = select_nominees(model, budget, max_pairs=max_pairs, frozen=True, scope="full")
    return cr_greedy_timings(model, pairs, T)
