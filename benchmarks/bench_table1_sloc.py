"""Benchmark: Table 1 — SLOC accounting (static artifact; the benchmark
guards that the counter itself stays cheap and deterministic)."""
from repro import sloc


def test_table1_sloc_summary(benchmark):
    result = benchmark(sloc.summary)
    assert result["modular_total"] > 0
    assert result["portability_factor"] > 1.0
