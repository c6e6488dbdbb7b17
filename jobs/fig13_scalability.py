"""Reproduce paper Fig. 13 (as a table): processing time of all variants
under vertex- and edge-sampling (20%..100%) of google and cit analogs.

Run: ``spark-submit jobs/fig13_scalability.py``.
"""
from _common import emit

from repro.experiments import scalability

if __name__ == "__main__":
    emit("Fig. 13 — scalability under V/E sampling", scalability())
