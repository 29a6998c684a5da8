"""Benchmark: regenerate Table 6 (per-iteration latency) at reduced scales.

The benchmark-suite run uses the three coarse scales only to stay fast;
``python jobs/table6.py`` measures all five rows including the 160K-vector
multiscale databases.
"""
from repro.bench.latency import table6


def test_table6_latency(benchmark, spark):
    got = benchmark.pedantic(
        table6,
        args=(spark,),
        kwargs={"reps": 1, "scales": [("ObjNet-", 5_000, False), ("BDD-", 8_000, False)]},
        rounds=1,
        iterations=1,
    )
    assert (got["prop."] > got["CLIP"]).all()  # propagation is the slow path
    print("\n[table6/quick]\n", got)
