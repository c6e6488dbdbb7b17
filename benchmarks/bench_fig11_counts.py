"""Benchmark + reproduction of paper Fig. 11 as a table (number of
k-VCCs). The distributed Spark pipeline handles two datasets end-to-end;
the local kernel covers all seven."""
import pytest

from repro.experiments import kvcc_counts


def test_fig11_counts_local(benchmark, emit_table):
    df = benchmark.pedantic(
        kvcc_counts, args=(None,), rounds=1, iterations=1
    )
    emit_table("Fig. 11 — number of k-VCCs (local kernel, all datasets)", df)
    trend = df.groupby("dataset").apply(
        lambda d: d.sort_values("k").n_vccs.iloc[0] >= d.sort_values("k").n_vccs.iloc[-1],
        include_groups=False,
    )
    # paper shape: counts do not increase with k
    assert trend.all()


def test_fig11_counts_distributed(benchmark, emit_table, spark):
    old = spark.conf.get("spark.sql.shuffle.partitions")
    spark.conf.set("spark.sql.shuffle.partitions", "8")
    try:
        df = benchmark.pedantic(
            kvcc_counts,
            args=(spark,),
            kwargs={"datasets": ("youtube",), "ks": (8, 12)},
            rounds=1,
            iterations=1,
        )
    finally:
        spark.conf.set("spark.sql.shuffle.partitions", old)
    emit_table("Fig. 11 — number of k-VCCs (Spark kernel mode)", df)
    local = kvcc_counts(None, datasets=("youtube",), ks=(8, 12))
    assert df.sort_values(["dataset", "k"]).n_vccs.tolist() == (
        local.sort_values(["dataset", "k"]).n_vccs.tolist()
    )
