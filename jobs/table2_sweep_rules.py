"""Reproduce paper Table 2: proportion of phase-1 vertices handled by
each sweep rule (NS_1, NS_2, GS) vs actually tested (Non-Pru) in VCCE*.

Run: ``spark-submit jobs/table2_sweep_rules.py``.
"""
from _common import emit

from repro.experiments import table2_sweep_rules

if __name__ == "__main__":
    emit("Table 2 — sweep rule proportions (VCCE*)", table2_sweep_rules())
