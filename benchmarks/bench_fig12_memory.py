"""Benchmark + reproduction of paper Fig. 12 as a table (peak memory of
the VCCE* kernel per dataset and k)."""
from repro.experiments import memory_usage


def test_fig12_memory(benchmark, emit_table):
    df = benchmark.pedantic(memory_usage, rounds=1, iterations=1)
    emit_table("Fig. 12 — peak kernel memory (tracemalloc)", df)
    assert (df.peak_mb > 0).all()
    # paper shape: memory stays in a modest, slowly-shrinking band as k
    # grows (bigger k prunes more in the k-core step)
    hi = df.groupby("dataset").peak_mb.max()
    lo = df.groupby("dataset").peak_mb.min()
    assert (hi / lo < 25).all()
