"""Tests for the distributed PPMI+SVD embedding trainer.

Spark-computed counts are oracle-checked against DuckDB SQL over the
same exploded token/context pairs.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest
import pyspark.sql.functions as F

from repro.embed_model.tokenizer import tokenize
from repro.embed_model.train import (
    factorize,
    ppmi_triples,
    token_context_pairs,
    train_embedding_model,
)
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def cells_pdf():
    return pd.DataFrame(
        {
            "table_id": [0, 0, 0, 0, 1, 1, 1, 1],
            "col_idx": [0, 0, 1, 1, 0, 0, 0, 1],
            "value": [
                "Acme Corp",
                "Beta Corp",
                "red",
                "blue",
                "Acme Corp",
                "Gamma Inc",
                "acme",
                "42",
            ],
        }
    )


@pytest.fixture(scope="module")
def cells_df(spark, cells_pdf):
    return spark.createDataFrame(cells_pdf)


def _expected_pairs(cells_pdf: pd.DataFrame) -> pd.DataFrame:
    recs = []
    for t, c, v in zip(
        cells_pdf["table_id"], cells_pdf["col_idx"], cells_pdf["value"]
    ):
        for tok in tokenize(v):
            recs.append((f"{t}:{c}", tok))
    return pd.DataFrame(recs, columns=["context", "token"])


def test_token_context_pairs_match_oracle(spark, cells_df, cells_pdf):
    """Pair counts per (context, token) agree with DuckDB over the same
    exploded pairs (catches tokenization or explode bugs)."""
    got = (
        token_context_pairs(cells_df)
        .groupBy("context", "token")
        .agg(F.count("*").alias("n"))
    )
    assert_equivalent(
        got,
        "SELECT context, token, count(*) AS n FROM pairs GROUP BY 1, 2",
        pairs=_expected_pairs(cells_pdf),
    )


def test_pairs_total_count(cells_df, cells_pdf):
    n_expected = len(_expected_pairs(cells_pdf))
    assert token_context_pairs(cells_df).count() == n_expected


def test_ppmi_positive_only(spark, cells_df):
    pairs = token_context_pairs(cells_df)
    triples = ppmi_triples(pairs, min_count=1).toPandas()
    assert (triples["ppmi"] > 0).all()


def test_ppmi_matches_manual(spark, cells_df, cells_pdf):
    """PPMI of one (token, context) cell equals the hand-computed value."""
    pairs_pdf = _expected_pairs(cells_pdf)
    total = len(pairs_pdf)
    nwc = len(
        pairs_pdf[(pairs_pdf["token"] == "corp") & (pairs_pdf["context"] == "0:0")]
    )
    nw = len(pairs_pdf[pairs_pdf["token"] == "corp"])
    nc = len(pairs_pdf[pairs_pdf["context"] == "0:0"])
    expected = max(0.0, np.log(nwc * total / (nw * nc)))
    triples = ppmi_triples(token_context_pairs(cells_df), min_count=1).toPandas()
    row = triples[(triples["token"] == "corp") & (triples["context"] == "0:0")]
    if expected > 0:
        assert row["ppmi"].iloc[0] == pytest.approx(expected, rel=1e-6)
    else:
        assert row.empty


def test_min_count_filters_rare_tokens(spark, cells_df):
    pairs = token_context_pairs(cells_df)
    strict = ppmi_triples(pairs, min_count=3).toPandas()
    # 'red'/'blue' appear once each — must be gone at min_count=3.
    assert "red" not in set(strict["token"])
    assert "blue" not in set(strict["token"])


def test_factorize_shapes_and_norms():
    triples = pd.DataFrame(
        {
            "token": ["a", "a", "b", "c"],
            "context": ["x", "y", "x", "y"],
            "ppmi": [1.0, 0.5, 0.7, 0.2],
        }
    )
    vocab, vecs = factorize(triples, dim=8)
    assert set(vocab) == {"a", "b", "c"}
    assert vecs.shape == (3, 8)
    norms = np.linalg.norm(vecs, axis=1)
    assert np.allclose(norms, 1.0, atol=1e-5)


def test_factorize_similar_rows_embed_close():
    """Tokens with identical context profiles get identical embeddings."""
    triples = pd.DataFrame(
        {
            "token": ["a", "a", "b", "b", "c"],
            "context": ["x", "y", "x", "y", "z"],
            "ppmi": [1.0, 0.5, 1.0, 0.5, 2.0],
        }
    )
    _, vecs = factorize(triples, dim=4)
    assert np.allclose(vecs[0], vecs[1], atol=1e-4)
    assert not np.allclose(vecs[0], vecs[2], atol=1e-2)


def test_train_end_to_end_tiny(spark, cells_df):
    m = train_embedding_model(spark, cells_df, dim=8, min_count=1)
    assert m.dim == 8
    assert "corp" in m.vocab
    v = m.embed_values(["Acme Corp"])
    assert v is not None and np.isclose(np.linalg.norm(v), 1.0, atol=1e-5)


def test_trained_model_determinism(spark, cells_df):
    a = train_embedding_model(spark, cells_df, dim=8, min_count=1)
    b = train_embedding_model(spark, cells_df, dim=8, min_count=1)
    assert a.vocab == b.vocab
    # SVD signs can flip per column; compare gram matrices instead.
    assert np.allclose(a.vectors @ a.vectors.T, b.vectors @ b.vectors.T, atol=1e-4)
