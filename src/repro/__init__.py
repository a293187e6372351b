"""Reproduction of "WarpGate: A Semantic Join Discovery System for Cloud
Data Warehouses" (Cong et al., CIDR 2023) as a PySpark codebase.

Packages:

* :mod:`repro.core` — the paper's contribution: column embeddings,
  SimHash LSH indexing, sampling, and the WarpGate system.
* :mod:`repro.embed_model` — the embedding-model substrate (tokenizer,
  synthetic web-table training corpus, PPMI+SVD trainer, BERT-like
  heavyweight model).
* :mod:`repro.corpus` — synthetic re-creations of the evaluation corpora
  (NextiaJD testbeds, Spider, Sigma Sample Database) plus the
  containment-based ground-truth labeler.
* :mod:`repro.baselines` — Aurum and D3L.
* :mod:`repro.eval` — metrics, harness, experiment drivers, and the
  paper's tables.
"""
