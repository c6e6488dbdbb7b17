"""Reproduce paper Fig. 11 (as a table): number of k-VCCs per dataset and
k. The local kernel covers all seven datasets; the distributed (Spark)
pipeline re-derives two representatives end-to-end (pass ``--full`` to
run every dataset through Spark; budget ~20 min).

Run: ``spark-submit jobs/fig11_kvcc_counts.py [--full]``.
"""
import sys

from _common import emit, get_spark

from repro.experiments import kvcc_counts

if __name__ == "__main__":
    emit("Fig. 11 — number of k-VCCs (local kernel, all datasets)", kvcc_counts(None))
    spark = get_spark()
    datasets = None if "--full" in sys.argv else ("youtube", "dblp")
    kwargs = {} if datasets is None else {"datasets": datasets}
    emit(
        "Fig. 11 — number of k-VCCs (distributed)",
        kvcc_counts(spark, **kwargs),
    )
    spark.stop()
