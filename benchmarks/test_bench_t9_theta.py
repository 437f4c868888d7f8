"""Benchmark for T9 / Fig. 7(b) sensitivity to theta.

One reduced cell-sweep per table (DESIGN.md §4); the full-size sweep
lives in ``jobs/table_t9.py`` and its output in EXPERIMENTS.md.
"""
from repro.experiments import harness as H


def test_bench_t9_theta(benchmark, runner):
    rows = benchmark.pedantic(lambda: H.table_t9_theta(runner, thetas=(1, 4), b=40, T=5), rounds=1, iterations=1)
    assert rows
