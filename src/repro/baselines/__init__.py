"""Baseline discovery systems: Aurum (syntactic graph) and D3L (ensemble)."""
