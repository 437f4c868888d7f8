"""End-to-end tests for Dysim and the baselines on small100."""
import numpy as np
import pytest

from repro.baselines import bundlegrd, cr_greedy_timings, hag, opt_bruteforce, ps
from repro.core.dysim import dysim
from repro.core.nominees import candidate_pool, select_nominees
from repro.data.datasets import make_dataset
from repro.diffusion.local import simulate


@pytest.fixture(scope="module")
def small():
    return make_dataset("small100").model


def _cost(model, seeds):
    return sum(float(model.cost[u, x]) for u, x, *_ in seeds)


class TestCandidatePoolAndNominees:
    def test_pool_size_and_uniqueness(self, small):
        pool = candidate_pool(small, max_pairs=30)
        assert len(pool) == 30
        assert len(set(pool)) == 30

    def test_pool_users_are_high_degree(self, small):
        pool = candidate_pool(small, max_pairs=20)
        top = set(np.argsort(-small.out_deg)[: small.params.cand_users])
        assert all(u in top for u, _ in pool)

    def test_nominees_respect_budget(self, small):
        noms = select_nominees(small, budget=10, max_pairs=20)
        assert _cost(small, [(u, x) for u, x in noms]) <= 10

    def test_zero_budget_selects_nothing(self, small):
        assert select_nominees(small, budget=0, max_pairs=10) == []

    def test_bigger_budget_never_fewer(self, small):
        a = select_nominees(small, budget=6, max_pairs=20)
        b = select_nominees(small, budget=14, max_pairs=20)
        assert len(b) >= len(a)

    def test_frozen_full_scope_runs(self, small):
        noms = select_nominees(small, budget=8, max_pairs=15, frozen=True, scope="full")
        assert _cost(small, noms) <= 8
        assert len(noms) >= 1


class TestDysim:
    def test_seed_group_valid(self, small):
        res = dysim(small, budget=10, T=4, max_pairs=30)
        assert res.seeds
        assert _cost(small, res.seeds) <= 10
        for u, x, t in res.seeds:
            assert 0 <= u < small.n_users
            assert 0 <= x < small.n_items
            assert 1 <= t <= 4

    def test_every_nominee_becomes_seed(self, small):
        res = dysim(small, budget=10, T=4, max_pairs=30)
        assert sorted((u, x) for u, x, _ in res.seeds) == sorted(res.nominees)

    def test_deterministic(self, small):
        a = dysim(small, budget=8, T=3, max_pairs=20)
        b = dysim(small, budget=8, T=3, max_pairs=20)
        assert a.seeds == b.seeds

    def test_empty_budget(self, small):
        res = dysim(small, budget=0, T=3)
        assert res.seeds == []

    def test_markets_partition_nominees(self, small):
        res = dysim(small, budget=10, T=4, max_pairs=30)
        market_noms = [n for mk in res.markets for n in mk.nominees]
        assert sorted(market_noms) == sorted(res.nominees)

    def test_groups_cover_markets(self, small):
        res = dysim(small, budget=10, T=4, max_pairs=30)
        idx = sorted(i for g in res.groups for i in g)
        assert idx == list(range(len(res.markets)))


class TestBaselines:
    @pytest.mark.parametrize("fn", [hag, ps, bundlegrd])
    def test_budget_and_timings(self, small, fn):
        seeds = fn(small, 12, 4)
        assert seeds, fn.__name__
        assert _cost(small, seeds) <= 12 + 1e-9
        assert all(1 <= t <= 4 for _, _, t in seeds)

    def test_bundlegrd_same_user_same_timing(self, small):
        seeds = bundlegrd(small, 15, 4)
        per_user = {}
        for u, x, t in seeds:
            per_user.setdefault(u, set()).add(t)
        assert all(len(ts) == 1 for ts in per_user.values())

    def test_ps_diversifies_users(self, small):
        seeds = ps(small, 15, 3)
        users = [u for u, _, _ in seeds]
        assert len(set(users)) >= 2

    def test_cr_greedy_assigns_all(self, small):
        pairs = [(0, 0), (1, 1), (2, 0)]
        seeds = cr_greedy_timings(small, pairs, T=5)
        assert sorted((u, x) for u, x, _ in seeds) == sorted(pairs)
        assert all(1 <= t <= 5 for _, _, t in seeds)

    def test_cr_greedy_empty(self, small):
        assert cr_greedy_timings(small, [], T=3) == []


class TestOpt:
    def test_respects_budget(self, small):
        seeds = opt_bruteforce(small, budget=5, T=2, pool_size=4, max_seeds=2,
                               n_samples=4, screen_samples=2, screen_keep=8)
        assert _cost(small, seeds) <= 5

    def test_beats_single_candidates(self, small):
        seeds = opt_bruteforce(small, budget=8, T=2, pool_size=4, max_seeds=2,
                               n_samples=8, screen_samples=2, screen_keep=16)
        best = simulate(small, seeds, 2, 8).sigma
        for u, x in candidate_pool(small, max_pairs=4):
            if small.cost[u, x] <= 8:
                single = simulate(small, [(u, x, 1)], 2, 8).sigma
                assert best >= single - 1e-9

    def test_empty_when_nothing_affordable(self, small):
        assert opt_bruteforce(small, budget=0.5, T=2, pool_size=3, max_seeds=2) == []
