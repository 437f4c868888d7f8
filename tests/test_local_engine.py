"""Tests for the local Monte-Carlo diffusion engine (repro.diffusion.local)."""
import numpy as np
import pytest

from repro.data.datasets import make_dataset
from repro.diffusion.local import likelihood_pi, simulate
from repro.diffusion.sigma import sigma_from_adopt_t
from repro.dynamics.state import ModelData
from repro.params import DEFAULT


def line_model(p_edge: float, n_items: int = 2, base_pref: float = 1.0) -> ModelData:
    """0 -> 1 -> 2 chain with controllable probabilities."""
    s = np.zeros((1, n_items, n_items))
    return ModelData(
        n_users=3, n_items=n_items,
        src=np.array([0, 1]), dst=np.array([1, 2]),
        base_inf=np.full(2, p_edge), s_c=s, s_s=s.copy(),
        base_pref=np.full((3, n_items), base_pref),
        importance=np.ones(n_items), cost=np.ones((3, n_items)),
        params=DEFAULT, seed=0,
    )


@pytest.fixture(scope="module")
def small():
    return make_dataset("small100").model


class TestDeterministicChains:
    def test_certain_propagation(self):
        m = line_model(p_edge=0.949)  # clipped to cap 0.95... keep below cap
        m = line_model(p_edge=0.94)
        res = simulate(m, [(0, 0, 1)], T=1, n_samples=4)
        # pref=1 (clipped), act=0.94: adoption nearly certain but random;
        # with p close to 1 all 4 samples should reach user 1.
        assert (res.adopt_t[:, 0, 0] == 1).all()

    def test_zero_preference_blocks(self):
        m = line_model(p_edge=0.9, base_pref=0.0)
        # pref floor is 0.02 so adoption is possible but very unlikely;
        # seeds themselves always adopt.
        res = simulate(m, [(0, 0, 1)], T=1, n_samples=8)
        assert (res.adopt_t[:, 0, 0] == 1).all()
        assert res.adopt_t[:, 2, 0].sum() == 0

    def test_seed_always_adopts(self):
        m = line_model(0.5)
        res = simulate(m, [(2, 1, 1)], T=1, n_samples=3)
        assert (res.adopt_t[:, 2, 1] == 1).all()

    def test_isolated_seed_spreads_nothing(self):
        m = line_model(0.9)
        res = simulate(m, [(2, 0, 1)], T=1, n_samples=3)
        assert res.sigma == pytest.approx(1.0)  # only the seed adoption


class TestEngineProperties:
    def test_deterministic(self, small):
        seeds = [(0, 0, 1), (5, 2, 2)]
        a = simulate(small, seeds, T=3, n_samples=8)
        b = simulate(small, seeds, T=3, n_samples=8)
        assert a.sigma == b.sigma
        assert np.array_equal(a.adopt_t, b.adopt_t)

    def test_salt_changes_randomness(self, small):
        seeds = [(0, 0, 1)]
        a = simulate(small, seeds, T=2, n_samples=8, trial_salt=0)
        b = simulate(small, seeds, T=2, n_samples=8, trial_salt=1)
        assert not np.array_equal(a.adopt_t, b.adopt_t)

    def test_more_seeds_more_sigma(self, small):
        few = simulate(small, [(0, 0, 1)], T=2, n_samples=16).sigma
        more = simulate(small, [(0, 0, 1), (1, 0, 1), (2, 1, 1)], T=2, n_samples=16).sigma
        assert more > few

    def test_sigma_by_t_sums_to_sigma(self, small):
        res = simulate(small, [(0, 0, 1), (3, 1, 2)], T=3, n_samples=8)
        assert res.sigma == pytest.approx(res.sigma_by_t.sum())

    def test_sigma_matches_adopt_t(self, small):
        res = simulate(small, [(0, 0, 1), (3, 1, 2)], T=3, n_samples=8)
        assert res.sigma == pytest.approx(
            sigma_from_adopt_t(res.adopt_t, small.importance)
        )

    def test_adoption_absorbing(self, small):
        # Re-seeding an adopted pair adds nothing.
        res = simulate(small, [(0, 0, 1), (0, 0, 2)], T=2, n_samples=8)
        assert (res.adopt_t[:, 0, 0] == 1).all()

    def test_invalid_timing_rejected(self, small):
        with pytest.raises(ValueError):
            simulate(small, [(0, 0, 7)], T=3, n_samples=2)

    def test_empty_seed_group(self, small):
        res = simulate(small, [], T=2, n_samples=2)
        assert res.sigma == 0.0

    def test_frozen_state_never_changes(self, small):
        from repro.dynamics.state import init_state

        res = simulate(small, [(0, 0, 1), (1, 1, 1)], T=2, n_samples=4, frozen=True)
        st0 = init_state(small, 4)
        assert np.array_equal(res.state.wc, st0.wc)
        assert np.array_equal(res.state.ws, st0.ws)

    def test_dynamic_state_changes(self, small):
        from repro.dynamics.state import init_state

        res = simulate(small, [(0, 0, 1), (0, 1, 1)], T=2, n_samples=4)
        st0 = init_state(small, 4)
        assert not np.allclose(res.state.wc, st0.wc)

    def test_importance_weighting(self):
        m = line_model(0.0, n_items=2)
        m.importance = np.array([1.0, 0.25])
        res = simulate(m, [(0, 0, 1), (1, 1, 1)], T=1, n_samples=2)
        assert res.sigma == pytest.approx(1.25)


class TestExtraAdoption:
    def test_ext_requires_relevance(self):
        # With zero relevance tensors no extra adoptions can happen.
        m = line_model(0.94)
        res = simulate(m, [(0, 0, 1)], T=1, n_samples=8)
        assert res.adopt_t[:, :, 1].sum() == 0

    def test_ext_triggers_with_strong_complement(self):
        m = line_model(0.94)
        m.s_c[0, 0, 1] = m.s_c[0, 1, 0] = 1.0
        res = simulate(m, [(0, 0, 1)], T=2, n_samples=32)
        # u=1 is promoted item 0 with p~0.9; P_ext ~ ext_scale*0.9*1.0;
        # some samples must extra-adopt item 1.
        assert res.adopt_t[:, 1, 1].sum() > 0


class TestLikelihoodPi:
    def test_nonnegative(self, small):
        res = simulate(small, [(0, 0, 1)], T=1, n_samples=4)
        assert likelihood_pi(small, res.state) >= 0.0

    def test_zero_without_adoptions(self, small):
        from repro.dynamics.state import init_state

        assert likelihood_pi(small, init_state(small, 2)) == 0.0

    def test_subset_of_users(self, small):
        res = simulate(small, [(0, 0, 1), (1, 1, 1)], T=1, n_samples=4)
        all_users = likelihood_pi(small, res.state)
        some = likelihood_pi(small, res.state, users=np.arange(10))
        assert 0.0 <= some <= all_users
