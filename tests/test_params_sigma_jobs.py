"""Tests for Params, the sigma helpers, and the job wrappers."""
import runpy
import sys

import numpy as np
import pandas as pd
import pytest

from repro.diffusion.sigma import sigma_from_adopt_t, sigma_from_adoption_rows
from repro.params import DEFAULT, Params


class TestParams:
    def test_defaults_sane(self):
        p = Params()
        assert 0 < p.pref_floor < 1
        assert 0 < p.act_floor < p.act_cap <= 1
        assert p.mc_plan >= 1 and p.mc_eval >= 1

    def test_with_replaces(self):
        p = DEFAULT.with_(gamma=0.9)
        assert p.gamma == 0.9
        assert p.eta == DEFAULT.eta
        assert DEFAULT.gamma != 0.9  # frozen original untouched

    def test_frozen(self):
        with pytest.raises(Exception):
            DEFAULT.gamma = 0.5  # type: ignore[misc]

    def test_hashable_for_cache_keys(self):
        assert hash(DEFAULT) == hash(Params())


class TestSigmaHelpers:
    def test_adopt_t_counting(self):
        adopt_t = np.zeros((2, 3, 2), dtype=np.int16)
        adopt_t[0, 0, 0] = 1  # sample 0 only
        adopt_t[0, 1, 1] = 2
        adopt_t[1, 1, 1] = 1
        w = np.array([1.0, 0.5])
        # item 0: mean 0.5 adopters; item 1: mean 1.0 adopters.
        assert sigma_from_adopt_t(adopt_t, w) == pytest.approx(0.5 * 1.0 + 1.0 * 0.5)

    def test_adoption_rows(self):
        rows = pd.DataFrame({"item": [0, 1, 1], "sample": [0, 0, 1], "user": [1, 2, 2]})
        w = np.array([1.0, 0.5])
        assert sigma_from_adoption_rows(rows, w, n_samples=2) == pytest.approx(
            (1.0 + 0.5 + 0.5) / 2
        )

    def test_empty_rows(self):
        assert sigma_from_adoption_rows(pd.DataFrame(columns=["item"]), np.ones(2), 4) == 0.0

    def test_never_adopted_is_zero(self):
        assert sigma_from_adopt_t(np.zeros((1, 4, 3), np.int16), np.ones(3)) == 0.0


class TestJobWrappers:
    @pytest.mark.parametrize("t", ["t1", "t3", "t7", "t9"])
    def test_table_job_runs_with_stubbed_harness(self, t, monkeypatch, capsys):
        """Each jobs/table_tN.py parses args and prints a markdown table."""
        import repro.experiments.harness as H

        stub_rows = [{"b": 1, "dysim": 2.0}]
        for name in dir(H):
            if name.startswith("table_"):
                monkeypatch.setattr(H, name, lambda r, **kw: stub_rows)
        monkeypatch.setattr(H, "Runner", lambda **kw: object())
        monkeypatch.setattr(sys, "argv", [f"table_{t}.py"])
        with pytest.raises(SystemExit) as exc:
            runpy.run_path(f"jobs/table_{t}.py", run_name="__main__")
        assert exc.value.code == 0
        out = capsys.readouterr().out
        assert "| b | dysim |" in out
