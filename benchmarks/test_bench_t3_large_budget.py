"""Benchmark for T3 / Fig. 6(a-c) sigma vs budget, large.

One reduced cell-sweep per table (DESIGN.md §4); the full-size sweep
lives in ``jobs/table_t3.py`` and its output in EXPERIMENTS.md.
"""
from repro.experiments import harness as H


def test_bench_t3_large_budget(benchmark, runner):
    rows = benchmark.pedantic(lambda: H.table_t3_large_budget(runner, datasets=('yelp_lite',), budgets=(40,), T=5), rounds=1, iterations=1)
    assert rows
