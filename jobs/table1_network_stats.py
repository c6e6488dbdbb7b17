"""Reproduce paper Table 1: network statistics of the (analog) datasets.

Run: ``spark-submit jobs/table1_network_stats.py`` (no Spark needed, but
kept uniform with the other jobs).
"""
from _common import emit

from repro.experiments import table1_network_stats

if __name__ == "__main__":
    emit("Table 1 — network statistics (analog vs paper)", table1_network_stats())
