"""Benchmark for T8 / Fig. 7(a) sensitivity to #meta-graphs.

One reduced cell-sweep per table (DESIGN.md §4); the full-size sweep
lives in ``jobs/table_t8.py`` and its output in EXPERIMENTS.md.
"""
from repro.experiments import harness as H


def test_bench_t8_metagraphs(benchmark, runner):
    rows = benchmark.pedantic(lambda: H.table_t8_metagraphs(runner, sizes=((1, 1), (3, 3)), b=40, T=5), rounds=1, iterations=1)
    assert rows
