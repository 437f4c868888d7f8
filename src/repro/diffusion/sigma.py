"""Importance-aware influence spread σ (Definition 1).

σ(S) = Σ_t Σ_x w_x · E[new adoptions of x in promotion t]. Because an
adoption is absorbing (a user never re-adopts), summing the
per-promotion new adoptions equals counting each (user, item) adoption
once at its promotion — which is what the engines record in
``adopt_t``. This module turns either engine's adoption output into σ.
"""
from __future__ import annotations

import numpy as np
import pandas as pd


def sigma_from_adopt_t(adopt_t: np.ndarray, importance: np.ndarray) -> float:
    """σ from the local engine's ``adopt_t [M, U, I]`` (0 = never)."""
    per_item = (adopt_t > 0).sum(axis=1).mean(axis=0)  # [I]
    return float((per_item * np.asarray(importance)).sum())


def sigma_from_adoption_rows(
    rows: pd.DataFrame, importance: np.ndarray, n_samples: int
) -> float:
    """σ from the Spark engine's collected adoption rows.

    ``rows`` has one row per (sample, user, item) adoption with an
    ``item`` column; the expectation is the mean over samples.
    """
    if len(rows) == 0:
        return 0.0
    w = np.asarray(importance)
    return float(w[rows["item"].to_numpy()].sum() / n_samples)
