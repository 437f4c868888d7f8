"""Benchmark-scope config: shared small-sample Runner factory."""
import pytest

from repro.experiments.harness import Runner


@pytest.fixture()
def runner() -> Runner:
    """A fresh Runner with benchmark-scale Monte-Carlo settings.

    Fresh per benchmark so the Runner's cell cache cannot hide the work
    being measured.
    """
    return Runner(mc_eval=8, max_pairs=60)
