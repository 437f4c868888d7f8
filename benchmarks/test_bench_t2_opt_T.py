"""Benchmark for T2 / Fig. 5(b) sigma vs #promotions vs OPT.

One reduced cell-sweep per table (DESIGN.md §4); the full-size sweep
lives in ``jobs/table_t2.py`` and its output in EXPERIMENTS.md.
"""
from repro.experiments import harness as H


def test_bench_t2_opt_T(benchmark, runner):
    rows = benchmark.pedantic(lambda: H.table_t2_opt_T(runner, Ts=(2,), b=6), rounds=1, iterations=1)
    assert rows
