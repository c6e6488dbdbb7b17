"""Reproduce paper Fig. 12 (as a table): peak memory of the VCCE* kernel
per dataset and k (tracemalloc stand-in for process RSS, DESIGN.md §3.4).

Run: ``spark-submit jobs/fig12_memory.py``.
"""
from _common import emit

from repro.experiments import memory_usage

if __name__ == "__main__":
    emit("Fig. 12 — peak memory of VCCE*", memory_usage())
