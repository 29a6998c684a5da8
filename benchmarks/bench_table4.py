"""Benchmark: regenerate Table 4 (ENS horizon x calibration)."""
from repro.bench.harness import table4


def test_table4_sweep(benchmark, spark):
    agg = benchmark.pedantic(table4, args=(spark, "test"), rounds=1, iterations=1)
    by = agg.groupby("config")["map_all"].mean()
    assert by["calibrated t=60"] >= by["raw t=60"] - 0.02
    print("\n[table4/test-scale]\n", by.round(3))
