"""Benchmark + reproduction of paper Fig. 10 as a table (processing time
of VCCE / VCCE-N / VCCE-G / VCCE*)."""
from repro.experiments import processing_time


def test_fig10_processing_time(benchmark, emit_table):
    df = benchmark.pedantic(processing_time, rounds=1, iterations=1)
    emit_table("Fig. 10 — processing time per variant", df)
    # paper shape: the optimized variants never do more LOC-CUT flow
    # tests than the basic algorithm, on any dataset/k
    piv = df.pivot_table(
        index=["dataset", "k"], columns="variant", values="loc_cut_calls"
    )
    assert (piv["vcce-star"] <= piv["vcce"]).all()
    assert (piv["vcce-n"] <= piv["vcce"]).all()
    assert (piv["vcce-g"] <= piv["vcce"]).all()
    # identical outputs across variants
    n = df.pivot_table(index=["dataset", "k"], columns="variant", values="n_vccs")
    assert n.nunique(axis=1).max() == 1
