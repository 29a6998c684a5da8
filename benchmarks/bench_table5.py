"""Benchmark: regenerate Table 5 (annotation-time aggregation)."""
from repro.bench.usertime import table5


def test_table5_aggregation(benchmark, spark):
    got = benchmark.pedantic(
        table5, args=(spark,), kwargs={"n_users": 40}, rounds=1, iterations=1
    )
    assert len(got) == 4
    print("\n[table5]\n", got)
