"""Evaluation: metrics, harness, experiment drivers, paper tables."""
