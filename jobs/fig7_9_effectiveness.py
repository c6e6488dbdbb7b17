"""Reproduce paper Figs. 7-9 (as a table): average diameter, edge density
and clustering coefficient of k-VCCs vs k-ECCs vs k-cores.

Run: ``spark-submit jobs/fig7_9_effectiveness.py``.
"""
from _common import emit

from repro.experiments import effectiveness_metrics

if __name__ == "__main__":
    emit("Figs. 7-9 — effectiveness (k-VCC vs k-ECC vs k-core)", effectiveness_metrics())
