"""Tests for the experiment drivers (tiny-scale runs of each table)."""
from __future__ import annotations

import pytest

from repro.eval.experiments import (
    ExperimentContext,
    experiment_fig4,
    experiment_sample_efficiency,
    experiment_sigma_shape,
    experiment_table2,
)


@pytest.fixture(scope="module")
def ctx(spark):
    return ExperimentContext(spark=spark, rows_scale=0.001, size_scale=0.12)


def test_context_lazy_model(ctx, model):
    assert ctx.model.dim == model.dim


def test_context_corpus_cached(ctx):
    a = ctx.corpus("XS")
    b = ctx.corpus("XS")
    assert a is b


def test_context_unknown_corpus(ctx):
    with pytest.raises(KeyError):
        ctx.corpus("nope")


def test_fig4_driver(ctx):
    table, results = experiment_fig4(ctx, "XS", ks=[1, 5], max_queries=6)
    assert set(table["system"]) == {"WarpGate", "Aurum", "D3L"}
    assert set(table["k"]) == {1, 5}
    assert ((table["precision"] >= 0) & (table["precision"] <= 1)).all()
    assert len(results) == 3


def test_table2_driver(ctx):
    df, per_ds = experiment_table2(ctx, datasets=("XS",), max_queries=5)
    row = df.iloc[0]
    assert row["dataset"] == "testbedXS"
    assert row["aurum_s"] < row["warpgate_s"]
    assert row["warpgate_lookup_s"] <= row["warpgate_s"]
    assert set(per_ds["testbedXS"]) == {"WarpGate", "Aurum", "D3L"}


def test_sample_efficiency_driver(ctx):
    df = experiment_sample_efficiency(
        ctx, datasets=("XS",), sample_sizes=(10, None), max_queries=5
    )
    assert list(df["sample"]) == ["10", "full"]
    assert ((df["r_at_10"] >= 0) & (df["r_at_10"] <= 1)).all()
    assert (df["e2e_s"] > 0).all()


def test_sample_efficiency_bertlike(ctx):
    df = experiment_sample_efficiency(
        ctx,
        datasets=("XS",),
        sample_sizes=(10,),
        max_queries=3,
        include_bertlike=True,
        bertlike_samples=(10,),
    )
    assert "bert:10" in set(df["sample"])


def test_sigma_shape_driver(ctx):
    shape = experiment_sigma_shape(ctx)
    assert shape["median_rows"] < shape["avg_rows"]
