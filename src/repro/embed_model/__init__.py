"""Embedding-model substrate: tokenizer, training corpus, trainer, models."""
