"""Benchmark: regenerate Table 2 (ablation stack) end to end.

Runs at test scale under pytest-benchmark (single round — the workload is a
full multi-method sweep); ``python jobs/table2.py bench`` produces the
bench-scale numbers recorded in EXPERIMENTS.md.
"""
from repro.bench.harness import pivot, table2


def test_table2_sweep(benchmark, spark):
    agg = benchmark.pedantic(table2, args=(spark, "test"), rounds=1, iterations=1)
    wide = pivot(agg)
    assert wide.loc["+DB align", "avg"] >= wide.loc["zero-shot CLIP", "avg"]
    print("\n[table2/test-scale]\n", wide)
