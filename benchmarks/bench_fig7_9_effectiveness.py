"""Benchmark + reproduction of paper Figs. 7-9 as a table (average
diameter / edge density / clustering coefficient per model)."""
from repro.experiments import effectiveness_metrics


def test_fig7_9_effectiveness(benchmark, emit_table):
    df = benchmark.pedantic(
        effectiveness_metrics,
        kwargs={"scale": 0.7},
        rounds=1,
        iterations=1,
    )
    emit_table("Figs. 7-9 — effectiveness (k-VCC vs k-ECC vs k-core)", df)
    nonempty = df[df["count"] > 0]
    piv = nonempty.pivot_table(
        index=["dataset", "k"], columns="model", values="density"
    )
    both = piv.dropna()
    # paper shape: k-VCC densest wherever all models produce output
    assert (both["k-VCC"] >= both["k-core"] - 1e-9).all()
