"""Disk-cached "pre-trained" embedding model.

The paper consumes Web Table Embeddings as a fixed pre-trained artifact;
our analogue is trained once over the synthetic web-table corpus (shared
:func:`~repro.corpus.domains.default_universe`) and cached as an ``.npz``
under ``.cache/`` so test and benchmark sessions load it instead of
retraining. Delete the cache file to force retraining.
"""
from __future__ import annotations

import os
import pathlib

from pyspark.sql import SparkSession

from repro.corpus.domains import default_universe
from repro.embed_model.model import EmbeddingModel
from repro.embed_model.train import train_embedding_model
from repro.embed_model.webtable_corpus import webtable_corpus_df

_DEFAULT_DIM = 64
_DEFAULT_N_TABLES = 400


def _cache_dir() -> pathlib.Path:
    root = os.environ.get("REPRO_CACHE_DIR")
    if root:
        return pathlib.Path(root)
    # __file__ = <repo>/src/repro/embed_model/pretrained.py → parents[3] = <repo>
    return pathlib.Path(__file__).resolve().parents[3] / ".cache"


def pretrained_model(
    spark: SparkSession,
    *,
    dim: int = _DEFAULT_DIM,
    n_tables: int = _DEFAULT_N_TABLES,
    refresh: bool = False,
) -> EmbeddingModel:
    """Load (or train-and-cache) the standard web-table embedding model."""
    cache = _cache_dir()
    cache.mkdir(parents=True, exist_ok=True)
    path = cache / f"webtab_d{dim}_t{n_tables}.npz"
    if path.exists() and not refresh:
        return EmbeddingModel.load(str(path))
    model = train_embedding_model(
        spark,
        webtable_corpus_df(spark, default_universe(), n_tables=n_tables),
        dim=dim,
    )
    model.save(str(path))
    return model
