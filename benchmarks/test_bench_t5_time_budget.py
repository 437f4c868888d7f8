"""Benchmark for T5 / Fig. 6(d) planner time vs budget.

One reduced cell-sweep per table (DESIGN.md §4); the full-size sweep
lives in ``jobs/table_t5.py`` and its output in EXPERIMENTS.md.
"""
from repro.experiments import harness as H


def test_bench_t5_time_budget(benchmark, runner):
    rows = benchmark.pedantic(lambda: H.table_t5_time_budget(runner, budgets=(40,), T=5), rounds=1, iterations=1)
    assert rows
