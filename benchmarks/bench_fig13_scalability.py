"""Benchmark + reproduction of paper Fig. 13 as a table (processing time
under vertex/edge sampling of the google and cit analogs)."""
from repro.experiments import scalability


def test_fig13_scalability(benchmark, emit_table):
    df = benchmark.pedantic(scalability, rounds=1, iterations=1)
    emit_table("Fig. 13 — scalability under V/E sampling", df)
    # paper shape: VCCE* total time never exceeds basic VCCE total time
    tot = df.groupby("variant").seconds.sum()
    assert tot["vcce-star"] <= tot["vcce"] * 1.1
    assert set(df.axis) == {"V", "E"}
    assert set(df.frac) == {0.2, 0.4, 0.6, 0.8, 1.0}
