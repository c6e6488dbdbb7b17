"""Comparison models from the paper's effectiveness study: k-ECC and
k-core (paper §6.1, Figs. 7-9)."""
