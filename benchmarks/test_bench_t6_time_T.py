"""Benchmark for T6 / Fig. 6(g) planner time vs #promotions.

One reduced cell-sweep per table (DESIGN.md §4); the full-size sweep
lives in ``jobs/table_t6.py`` and its output in EXPERIMENTS.md.
"""
from repro.experiments import harness as H


def test_bench_t6_time_T(benchmark, runner):
    rows = benchmark.pedantic(lambda: H.table_t6_time_T(runner, Ts=(5,), b=40), rounds=1, iterations=1)
    assert rows
