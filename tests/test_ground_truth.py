"""Tests for the containment-based ground-truth labeler (Spark vs DuckDB)."""
from __future__ import annotations

import pandas as pd
import pytest

from repro.corpus.ground_truth import (
    build_queries,
    containment_df,
    label_pairs,
    normalized_distinct_df,
    quality_label,
)
from repro.embed_model.tokenizer import normalize
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def cells_pdf():
    return pd.DataFrame(
        {
            "col_id": ["A"] * 4 + ["B"] * 4 + ["C"] * 2,
            "value": [
                "Acme Corp", "Beta Inc", "Gamma LLC", "Acme Corp",  # A (3 distinct)
                "ACME-CORP", "beta_inc", "Delta Co", "Delta Co",    # B (3 distinct)
                "Zeta", "Eta",                                       # C
            ],
        }
    )


@pytest.fixture(scope="module")
def cells_df(spark, cells_pdf):
    return spark.createDataFrame(cells_pdf)


@pytest.fixture(scope="module")
def groups_df(spark):
    return spark.createDataFrame(
        pd.DataFrame({"col_id": ["A", "B", "C"], "grp": ["g1", "g1", "g2"]})
    )


def _norm_pdf(cells_pdf):
    out = cells_pdf.copy()
    out["nval"] = [normalize(v) for v in out["value"]]
    return out[out["nval"] != ""][["col_id", "nval"]].drop_duplicates()


def test_normalized_distinct_matches_oracle(spark, cells_df, cells_pdf):
    got = normalized_distinct_df(cells_df)
    assert_equivalent(
        got,
        "SELECT DISTINCT col_id, nval FROM norm",
        norm=_norm_pdf(cells_pdf),
    )


def test_containment_matches_oracle(spark, cells_df, cells_pdf, groups_df):
    """Directed containment computed by the Spark self-join equals the
    set-algebra definition computed by DuckDB."""
    got = containment_df(normalized_distinct_df(cells_df), groups_df)
    sql = """
        WITH g AS (SELECT 'A' AS col_id, 'g1' AS grp UNION ALL
                   SELECT 'B', 'g1' UNION ALL SELECT 'C', 'g2'),
        v AS (SELECT DISTINCT n.col_id, n.nval, g.grp
              FROM norm n JOIN g ON n.col_id = g.col_id),
        cards AS (SELECT col_id, count(*) AS card FROM v GROUP BY 1),
        inter AS (
          SELECT a.col_id AS a, b.col_id AS b, count(*) AS n_inter
          FROM v a JOIN v b ON a.nval = b.nval AND a.grp = b.grp
          WHERE a.col_id <> b.col_id GROUP BY 1, 2)
        SELECT i.a, i.b, ca.card AS card_a, cb.card AS card_b,
               i.n_inter * 1.0 / ca.card AS containment
        FROM inter i
        JOIN cards ca ON ca.col_id = i.a
        JOIN cards cb ON cb.col_id = i.b
    """
    assert_equivalent(got, sql, norm=_norm_pdf(cells_pdf))


def test_containment_values(spark, cells_df, groups_df):
    pairs = containment_df(
        normalized_distinct_df(cells_df), groups_df
    ).toPandas().set_index(["a", "b"])
    # A={acme corp, beta inc, gamma llc}, B={acme corp, beta inc, delta co}
    assert pairs.loc[("A", "B"), "containment"] == pytest.approx(2 / 3)
    assert pairs.loc[("B", "A"), "containment"] == pytest.approx(2 / 3)
    # C is alone in its group → no pairs.
    assert not [i for i in pairs.index if "C" in i]


@pytest.mark.parametrize(
    "containment,ca,cb,expected",
    [
        (0.9, 100, 100, "High"),
        (0.8, 100, 350, "High"),
        (0.8, 100, 500, "Good"),  # card proportion 5 > 4
        (0.6, 100, 100, "Good"),
        (0.6, 100, 900, "None"),  # proportion 9 > 8
        (0.4, 100, 100, "None"),
        (0.75, 100, 400, "High"),  # boundary: prop exactly 4
        (0.5, 100, 800, "Good"),  # boundary: prop exactly 8
    ],
)
def test_quality_label(containment, ca, cb, expected):
    assert quality_label(containment, ca, cb) == expected


def test_label_pairs_adds_column():
    pdf = pd.DataFrame(
        {
            "a": ["x"], "b": ["y"], "card_a": [10], "card_b": [12],
            "containment": [0.9],
        }
    )
    out = label_pairs(pdf)
    assert out["quality"].tolist() == ["High"]


def test_build_queries_xs(xs_corpus):
    spec, wh = xs_corpus
    queries = build_queries(wh)
    assert queries == spec.queries
    assert all(q.answers for q in queries)
    assert all(q.column not in q.answers for q in queries)


def test_answers_are_symmetricish(xs_corpus):
    """If B answers A with High containment both ways, A should answer B
    too for most pairs (sanity of the directed labeling)."""
    spec, _ = xs_corpus
    amap = {q.column: q.answers for q in spec.queries}
    back = 0
    total = 0
    for q in spec.queries:
        for b in q.answers:
            if b in amap:
                total += 1
                back += q.column in amap[b]
    assert total > 0 and back / total > 0.7


def test_hard_negatives_not_answers(xs_corpus):
    """Same-domain disjoint-slice columns must be excluded by labeling."""
    spec, _ = xs_corpus
    hn_cols = {
        t.col_id(c.name)
        for t in spec.tables
        for c in t.columns
        if c.kind == "entity" and c.group is None and c.pool_lo >= 0.85
    }
    assert hn_cols
    for q in spec.queries:
        assert not (q.answers & hn_cols)
