"""Reproduce paper Fig. 10 (as a table): processing time of VCCE,
VCCE-N, VCCE-G and VCCE* per dataset and k, plus LOC-CUT call counts.

Run: ``spark-submit jobs/fig10_processing_time.py``.
"""
from _common import emit

from repro.experiments import processing_time

if __name__ == "__main__":
    emit("Fig. 10 — processing time per variant", processing_time())
