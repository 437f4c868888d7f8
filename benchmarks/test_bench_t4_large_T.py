"""Benchmark for T4 / Fig. 6(e-f) sigma vs #promotions, large.

One reduced cell-sweep per table (DESIGN.md §4); the full-size sweep
lives in ``jobs/table_t4.py`` and its output in EXPERIMENTS.md.
"""
from repro.experiments import harness as H


def test_bench_t4_large_T(benchmark, runner):
    rows = benchmark.pedantic(lambda: H.table_t4_large_T(runner, datasets=('yelp_lite',), Ts=(5,), b=40), rounds=1, iterations=1)
    assert rows
