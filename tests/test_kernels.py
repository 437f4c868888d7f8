"""Tests for the IMDPP dynamics kernels (repro.dynamics.kernels)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st
from hypothesis.extra.numpy import arrays

from repro.dynamics import kernels


def _toy_tensors(n_meta=2, n_items=4, seed=0):
    g = np.random.default_rng(seed)
    s = g.random((n_meta, n_items, n_items))
    s = (s + s.transpose(0, 2, 1)) / 2
    for m in range(n_meta):
        np.fill_diagonal(s[m], 0.0)
    return s


class TestNormalizeRows:
    def test_simplex(self):
        w = kernels.normalize_rows(np.array([[1.0, 3.0], [2.0, 2.0]]))
        assert np.allclose(w.sum(axis=1), 1.0)
        assert np.allclose(w[0], [0.25, 0.75])

    def test_clips_negatives(self):
        w = kernels.normalize_rows(np.array([[-1.0, 1.0]]))
        assert np.allclose(w, [[0.0, 1.0]])

    def test_zero_row_becomes_uniform(self):
        w = kernels.normalize_rows(np.zeros((1, 4)))
        assert np.allclose(w, 0.25)

    @given(arrays(np.float64, (3, 5), elements=st.floats(-2, 2)))
    @settings(max_examples=40, deadline=None)
    def test_always_simplex(self, w):
        out = kernels.normalize_rows(w)
        assert np.allclose(out.sum(axis=-1), 1.0)
        assert (out >= 0).all()


class TestInitWeights:
    def test_shape_and_simplex(self):
        w = kernels.init_weights(10, 3, seed=1, tag=kernels.TAG_WEIGHT_INIT_C)
        assert w.shape == (10, 3)
        assert np.allclose(w.sum(axis=1), 1.0)

    def test_deterministic(self):
        a = kernels.init_weights(5, 3, 7, 11)
        b = kernels.init_weights(5, 3, 7, 11)
        assert np.array_equal(a, b)

    def test_seed_changes_weights(self):
        a = kernels.init_weights(5, 3, 7, 11)
        b = kernels.init_weights(5, 3, 8, 11)
        assert not np.allclose(a, b)

    def test_near_uniform(self):
        w = kernels.init_weights(100, 4, 0, 11)
        assert abs(w.mean() - 0.25) < 0.02


class TestPreference:
    def test_no_adoptions_is_clipped_base(self):
        s_c, s_s = _toy_tensors(), _toy_tensors(seed=1)
        base = np.array([0.01, 0.3, 0.6, 0.9])
        pref = kernels.preference(
            base, np.zeros(4, bool), np.full(2, 0.5), np.full(2, 0.5),
            s_c, s_s, 0.4, 0.4, 0.05,
        )
        assert np.allclose(pref, np.clip(base, 0.05, 1.0))

    def test_complement_raises(self):
        s_c = np.zeros((1, 3, 3))
        s_c[0, 0, 1] = s_c[0, 1, 0] = 0.8
        s_s = np.zeros((1, 3, 3))
        ad = np.array([True, False, False])
        pref = kernels.preference(
            np.full(3, 0.3), ad, np.ones(1), np.ones(1), s_c, s_s, 0.5, 0.5, 0.02
        )
        assert pref[1] == pytest.approx(0.3 + 0.5 * 0.8)
        assert pref[2] == pytest.approx(0.3)

    def test_substitute_lowers(self):
        s_c = np.zeros((1, 3, 3))
        s_s = np.zeros((1, 3, 3))
        s_s[0, 0, 1] = s_s[0, 1, 0] = 0.8
        ad = np.array([True, False, False])
        pref = kernels.preference(
            np.full(3, 0.3), ad, np.ones(1), np.ones(1), s_c, s_s, 0.5, 0.5, 0.02
        )
        assert pref[1] == pytest.approx(max(0.3 - 0.4, 0.02))

    def test_floor_applies(self):
        s_c = np.zeros((1, 2, 2))
        s_s = np.zeros((1, 2, 2))
        s_s[0, 0, 1] = s_s[0, 1, 0] = 1.0
        pref = kernels.preference(
            np.full(2, 0.1), np.array([True, False]), np.ones(1), np.ones(1),
            s_c, s_s, 0.5, 0.9, 0.02,
        )
        assert pref[1] == pytest.approx(0.02)

    def test_batch_matches_scalar(self):
        s_c, s_s = _toy_tensors(3, 6), _toy_tensors(3, 6, seed=2)
        g = np.random.default_rng(3)
        base = g.random((5, 6)) * 0.5
        ad = g.random((5, 6)) > 0.5
        wc = kernels.normalize_rows(g.random((5, 3)))
        ws = kernels.normalize_rows(g.random((5, 3)))
        batch = kernels.preference_batch(base, ad, wc, ws, s_c, s_s, 0.4, 0.4, 0.02)
        for i in range(5):
            one = kernels.preference(
                base[i], ad[i], wc[i], ws[i], s_c, s_s, 0.4, 0.4, 0.02
            )
            assert np.allclose(batch[i], one)


class TestInfluenceStrength:
    def test_empty_sets_give_base(self):
        act = kernels.influence_strength(np.array([0.2]), [0], [0], 0.5, 0.01, 0.95)
        assert act[0] == pytest.approx(0.2)

    def test_jaccard_boost(self):
        act = kernels.influence_strength(np.array([0.2]), [2], [4], 0.5, 0.01, 0.95)
        assert act[0] == pytest.approx(0.2 + 0.5 * 0.5)

    def test_cap(self):
        act = kernels.influence_strength(np.array([0.9]), [9], [9], 1.0, 0.01, 0.95)
        assert act[0] == pytest.approx(0.95)

    def test_floor(self):
        act = kernels.influence_strength(np.array([0.0]), [0], [5], 0.5, 0.01, 0.95)
        assert act[0] == pytest.approx(0.01)

    def test_vectorized(self):
        act = kernels.influence_strength(
            np.full(3, 0.1), [0, 1, 2], [0, 2, 2], 0.4, 0.01, 0.95
        )
        assert act.shape == (3,)
        assert act[2] > act[1] > act[0]


class TestRelevanceRow:
    def test_weighted_combination(self):
        s = _toy_tensors(2, 4)
        w = np.array([0.3, 0.7])
        row = kernels.relevance_row(w, s, 1)
        assert np.allclose(row, 0.3 * s[0, 1] + 0.7 * s[1, 1])

    def test_diagonal_zero(self):
        s = _toy_tensors(2, 4)
        assert kernels.relevance_row(np.ones(2), s, 2)[2] == 0.0


class TestWeightUpdates:
    def test_gain_hand_example(self):
        s = np.zeros((2, 3, 3))
        s[0, 0, 2] = s[0, 2, 0] = 0.5  # meta 0 relates items 0 and 2
        ad_after = np.array([True, False, True])  # owns 0, newly adopted 2
        gains = kernels.weight_gains(ad_after, np.array([2]), s)
        assert gains[0] == pytest.approx(0.5)
        assert gains[1] == pytest.approx(0.0)

    def test_update_reinforces_matching_meta(self):
        s_c = np.zeros((2, 3, 3))
        s_c[0, 0, 1] = s_c[0, 1, 0] = 1.0
        s_s = np.zeros((2, 3, 3))
        ad = np.array([True, True, False])
        wc, ws = kernels.update_weights(
            np.full(2, 0.5), np.full(2, 0.5), ad, np.array([1]), s_c, s_s, 0.5
        )
        assert wc[0] > wc[1]  # meta 0 explained the co-adoption
        assert np.allclose(wc.sum(), 1.0)
        assert np.allclose(ws, 0.5)  # no substitutable instances -> unchanged

    def test_no_relevance_no_change(self):
        s = np.zeros((2, 3, 3))
        wc, ws = kernels.update_weights(
            np.array([0.6, 0.4]), np.array([0.3, 0.7]),
            np.array([True, False, True]), np.array([2]), s, s, 0.5,
        )
        assert np.allclose(wc, [0.6, 0.4])
        assert np.allclose(ws, [0.3, 0.7])

    def test_two_new_items_symmetric(self):
        s = _toy_tensors(2, 4)
        ad = np.array([False, True, True, False])
        g12 = kernels.weight_gains(ad, np.array([1, 2]), s)
        g21 = kernels.weight_gains(ad, np.array([2, 1]), s)
        assert np.allclose(g12, g21)
