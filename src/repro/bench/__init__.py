"""Benchmark harness: AP metric, interactive-loop simulator, table drivers."""
from repro.bench.ap import average_precision  # noqa: F401
from repro.bench.loop import SearchOutcome, run_search  # noqa: F401
