"""Distributed training of the web-table token embedding model.

Pipeline (all heavy steps are Spark DataFrame operations over the cell
corpus; only the final small-matrix factorization is driver-side numpy,
as is standard when vocab ≪ corpus):

1. **Tokenize** cells into ``(context, token)`` pairs, where the context
   of a token is the web-table column it appears in. This is the
   column-context distributional model: tokens sharing semantic domains
   co-occur in the same columns across the corpus.
2. **Count** ``n(w, c)`` with a groupBy, plus marginals ``n(w)``,
   ``n(c)`` and the corpus total ``N``.
3. **PPMI** via SQL expressions: ``max(0, log(n(w,c)·N / n(w)·n(c)))``.
4. **Factorize**: collect the sparse PPMI triples (vocab × contexts is
   a few-thousand by few-thousand matrix), dense-ify as float32, take a
   truncated SVD, and emit ``U_k · Σ_k^{1/2}`` rows, L2-normalized.

The result is an :class:`~repro.embed_model.model.EmbeddingModel`.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
import pyspark.sql.functions as F

from repro.embed_model.model import EmbeddingModel
from repro.embed_model.tokenizer import tokenize


def token_context_pairs(cells: DataFrame) -> DataFrame:
    """``(context, token)`` pairs from a ``(table_id, col_idx, value)`` frame."""

    def _explode(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            ctx: list[str] = []
            toks: list[str] = []
            for t, c, v in zip(pdf["table_id"], pdf["col_idx"], pdf["value"]):
                for tok in tokenize(v):
                    ctx.append(f"{t}:{c}")
                    toks.append(tok)
            yield pd.DataFrame({"context": ctx, "token": toks})

    return cells.mapInPandas(_explode, schema="context string, token string")


def ppmi_triples(pairs: DataFrame, *, min_count: int = 2) -> DataFrame:
    """Sparse PPMI matrix as a ``(token, context, ppmi)`` DataFrame."""
    nwc = pairs.groupBy("token", "context").agg(F.count("*").alias("nwc"))
    nw = pairs.groupBy("token").agg(F.count("*").alias("nw")).where(
        F.col("nw") >= min_count
    )
    nc = pairs.groupBy("context").agg(F.count("*").alias("nc"))
    total = pairs.count()
    return (
        nwc.join(nw, "token")
        .join(nc, "context")
        .select(
            "token",
            "context",
            F.greatest(
                F.lit(0.0),
                F.log(F.col("nwc") * F.lit(float(total)) / (F.col("nw") * F.col("nc"))),
            ).alias("ppmi"),
        )
        .where(F.col("ppmi") > 0)
    )


def factorize(
    triples: pd.DataFrame, *, dim: int = 64
) -> tuple[dict[str, int], np.ndarray]:
    """Truncated SVD of the collected PPMI triples → normalized rows."""
    tokens = sorted(triples["token"].unique())
    contexts = sorted(triples["context"].unique())
    t_idx = {t: i for i, t in enumerate(tokens)}
    c_idx = {c: i for i, c in enumerate(contexts)}
    M = np.zeros((len(tokens), len(contexts)), dtype=np.float32)
    M[
        triples["token"].map(t_idx).to_numpy(),
        triples["context"].map(c_idx).to_numpy(),
    ] = triples["ppmi"].to_numpy(dtype=np.float32)
    # Economy SVD; dim capped by the matrix rank.
    u, s, _ = np.linalg.svd(M, full_matrices=False)
    k = min(dim, len(s))
    vecs = (u[:, :k] * np.sqrt(s[:k])).astype(np.float32)
    if k < dim:  # pad so every model has the requested dimensionality
        vecs = np.pad(vecs, ((0, 0), (0, dim - k)))
    norms = np.linalg.norm(vecs, axis=1, keepdims=True)
    norms[norms == 0] = 1.0
    return {t: i for i, t in enumerate(tokens)}, (vecs / norms).astype(np.float32)


def train_embedding_model(
    spark: SparkSession,
    cells: DataFrame,
    *,
    dim: int = 64,
    min_count: int = 2,
) -> EmbeddingModel:
    """End-to-end trainer: cells DataFrame → :class:`EmbeddingModel`."""
    pairs = token_context_pairs(cells)
    triples = ppmi_triples(pairs, min_count=min_count).toPandas()
    vocab, vectors = factorize(triples, dim=dim)
    return EmbeddingModel(vocab=vocab, vectors=vectors)
