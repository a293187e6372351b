"""Tests for the DuckDB oracle plumbing and the model cache."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.embed_model.pretrained import pretrained_model
from repro.oracle import assert_equivalent


def test_oracle_accepts_matching_result(spark):
    pdf = pd.DataFrame({"k": [1, 1, 2], "v": [1.0, 2.0, 3.0]})
    df = spark.createDataFrame(pdf).groupBy("k").sum("v").toDF("k", "s")
    assert_equivalent(df, "SELECT k, sum(v) AS s FROM t GROUP BY k", t=pdf)


def test_oracle_rejects_wrong_result(spark):
    pdf = pd.DataFrame({"k": [1, 2], "v": [1.0, 2.0]})
    df = spark.createDataFrame(pdf.assign(v=[9.0, 9.0])).select("k", "v")
    with pytest.raises(AssertionError):
        assert_equivalent(df, "SELECT k, v FROM t", t=pdf)


def test_oracle_rejects_column_mismatch(spark):
    pdf = pd.DataFrame({"k": [1]})
    df = spark.createDataFrame(pd.DataFrame({"other": [1]}))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(df, "SELECT k FROM t", t=pdf)


def test_oracle_accepts_spark_input_tables(spark):
    pdf = pd.DataFrame({"k": [1, 2, 2]})
    sdf = spark.createDataFrame(pdf)
    got = sdf.groupBy("k").count().toDF("k", "n")
    assert_equivalent(got, "SELECT k, count(*) AS n FROM t GROUP BY k", t=sdf)


def test_pretrained_model_cached(spark, model, tmp_path, monkeypatch):
    """Loading twice returns identical vectors without retraining; a
    fresh cache dir triggers training."""
    again = pretrained_model(spark)
    assert again.vocab == model.vocab
    assert np.allclose(again.vectors, model.vectors)


def test_pretrained_model_trains_into_cache(spark, tmp_path, monkeypatch):
    monkeypatch.setenv("REPRO_CACHE_DIR", str(tmp_path))
    m = pretrained_model(spark, dim=16, n_tables=20)
    assert (tmp_path / "webtab_d16_t20.npz").exists()
    m2 = pretrained_model(spark, dim=16, n_tables=20)
    assert m2.vocab == m.vocab
