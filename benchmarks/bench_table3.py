"""Benchmark: regenerate Table 3 (baseline comparison, coarse indexing)."""
from repro.bench.harness import pivot, table3


def test_table3_sweep(benchmark, spark):
    agg = benchmark.pedantic(table3, args=(spark, "test"), rounds=1, iterations=1)
    wide = pivot(agg)
    assert set(wide.index) >= {"zero-shot CLIP", "ENS", "Rocchio", "this work"}
    print("\n[table3/test-scale]\n", wide)
