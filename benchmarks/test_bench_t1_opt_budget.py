"""Benchmark for T1 / Fig. 5(a) sigma vs budget vs OPT.

One reduced cell-sweep per table (DESIGN.md §4); the full-size sweep
lives in ``jobs/table_t1.py`` and its output in EXPERIMENTS.md.
"""
from repro.experiments import harness as H


def test_bench_t1_opt_budget(benchmark, runner):
    rows = benchmark.pedantic(lambda: H.table_t1_opt_budget(runner, budgets=(6,), T=2), rounds=1, iterations=1)
    assert rows
