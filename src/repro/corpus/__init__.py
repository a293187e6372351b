"""Synthetic evaluation corpora and ground-truth labeling."""
