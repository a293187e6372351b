"""Tests for the synthetic web-table training corpus."""
from __future__ import annotations

import numpy as np
import pytest

from repro.corpus.domains import build_universe
from repro.embed_model.webtable_corpus import (
    generate_webtable_cells,
    webtable_corpus_df,
)


@pytest.fixture(scope="module")
def uni():
    return build_universe(n_per_kind=2, n_entities=50, seed=5)


@pytest.fixture(scope="module")
def cells(uni):
    return generate_webtable_cells(uni, n_tables=30, seed=3)


def test_schema(cells):
    assert list(cells.columns) == ["table_id", "col_idx", "value"]
    assert cells["value"].map(lambda v: isinstance(v, str)).all()


def test_table_count(cells):
    assert cells["table_id"].nunique() == 30


def test_rows_within_bounds(uni):
    cells = generate_webtable_cells(
        uni, n_tables=10, rows_per_table=(5, 10), cols_per_table=(2, 3), seed=1
    )
    per_col = cells.groupby(["table_id", "col_idx"]).size()
    assert per_col.between(5, 9).all()


def test_deterministic(uni):
    a = generate_webtable_cells(uni, n_tables=5, seed=9)
    b = generate_webtable_cells(uni, n_tables=5, seed=9)
    assert a.equals(b)


def test_columns_are_domain_coherent(cells, uni):
    """Most columns draw the bulk of their values from one domain."""
    ent_to_dom = {}
    for d in uni.domains:
        for e in d.entities:
            ent_to_dom[e.lower().replace(" ", "")] = d.name

    def dom_of(v: str):
        key = "".join(ch for ch in v.lower() if ch.isalnum())
        return ent_to_dom.get(key)

    coherent = 0
    groups = cells.groupby(["table_id", "col_idx"])
    for _, grp in groups:
        doms = [dom_of(v) for v in grp["value"]]
        doms = [d for d in doms if d]
        if doms and max(np.unique(doms, return_counts=True)[1]) / len(doms) > 0.9:
            coherent += 1
    assert coherent / len(groups) > 0.5


def test_spark_df(spark, uni):
    df = webtable_corpus_df(spark, uni, n_tables=5, seed=2)
    assert df.columns == ["table_id", "col_idx", "value"]
    assert df.count() == len(generate_webtable_cells(uni, n_tables=5, seed=2))
