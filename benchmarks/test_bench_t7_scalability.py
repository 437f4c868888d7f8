"""Benchmark for T7 / Fig. 6(h) Dysim scalability.

One reduced cell-sweep per table (DESIGN.md §4); the full-size sweep
lives in ``jobs/table_t7.py`` and its output in EXPERIMENTS.md.
"""
from repro.experiments import harness as H


def test_bench_t7_scalability(benchmark, runner):
    rows = benchmark.pedantic(lambda: H.table_t7_scalability(runner, datasets=('yelp_lite', 'gowalla_lite'), b=40, T=5), rounds=1, iterations=1)
    assert rows
