"""Benchmark + reproduction of paper Table 1 (network statistics)."""
from repro.experiments import table1_network_stats


def test_table1_network_stats(benchmark, emit_table):
    df = benchmark.pedantic(table1_network_stats, rounds=1, iterations=1)
    emit_table("Table 1 — network statistics (analogs vs paper)", df)
    assert len(df) == 7
