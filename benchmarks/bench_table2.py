"""Benchmark + reproduction of paper Table 2 (sweep-rule proportions)."""
from repro.experiments import table2_sweep_rules


def test_table2_sweep_rules(benchmark, emit_table):
    df = benchmark.pedantic(table2_sweep_rules, rounds=1, iterations=1)
    emit_table("Table 2 — proportion per sweep rule (VCCE*)", df)
    # every dataset's sweeps must prune something; shares sum to 1
    for _, r in df.iterrows():
        assert abs(r["NS_1"] + r["NS_2"] + r["GS"] + r["Non-Pru"] - 1.0) < 0.01
        assert r["Non-Pru"] < 1.0
