"""Reproduction of "Enumerating k-Vertex Connected Components in Large
Graphs" (ICDE 2019) in PySpark.

Subpackages: ``core`` (KVCC-ENUM + sweeps), ``flow`` (max-flow vertex
cuts), ``graph`` (local + DataFrame graph substrates, generators),
``baselines`` (k-ECC, k-core). ``experiments`` reproduces each table and
figure of the paper's evaluation; ``oracle`` is the DuckDB
result-equality checker; ``synth_data`` holds the synthetic dataset
generators.
"""
