"""Tests for the Spider-lite PK/FK corpus."""
from __future__ import annotations

import pytest

from repro.corpus.spider import (
    AVG_ROWS,
    N_COLS,
    N_QUERIES,
    N_TABLES,
    build_spider_spec,
)


@pytest.fixture(scope="module")
def spec():
    s, _ = build_spider_spec(rows_scale=0.01)
    return s


def test_shape_matches_paper(spec):
    assert spec.n_tables == N_TABLES
    assert spec.n_columns == N_COLS
    assert len(spec.queries) == N_QUERIES
    assert spec.avg_rows == pytest.approx(AVG_ROWS * 0.01, rel=0.3)


def test_avg_answers_near_paper(spec):
    assert 1.0 <= spec.avg_answers <= 1.3


def test_queries_are_fk_columns(spec):
    for q in spec.queries:
        c = spec.column_spec(q.column)
        assert c.kind == "entity"
        assert c.pool_hi - c.pool_lo == pytest.approx(0.45)


def test_answers_are_pk_columns_same_db(spec):
    for q in spec.queries:
        qdb = q.column.split(".")[0]
        for a in q.answers:
            assert a.split(".")[0] == qdb, "PK/FK ground truth is per-db"
            pk = spec.column_spec(a)
            assert pk.pool_lo == 0.0 and pk.pool_hi == pytest.approx(0.85)


def test_fk_and_pk_share_domain(spec):
    for q in spec.queries:
        fk = spec.column_spec(q.column)
        for a in q.answers:
            assert spec.column_spec(a).domain == fk.domain


def test_fk_formats_split_syntactic_semantic(spec):
    """Roughly half the FKs render in a different format than their PK —
    the share of join paths syntactic methods cannot see."""
    diff = 0
    for q in spec.queries:
        fk = spec.column_spec(q.column)
        pk = spec.column_spec(next(iter(q.answers)))
        diff += fk.fmt != pk.fmt
    share = diff / len(spec.queries)
    assert 0.25 <= share <= 0.75


def test_fk_names_mostly_match_pk(spec):
    same = 0
    for q in spec.queries:
        pk_name = next(iter(q.answers)).split(".")[-1]
        fk_name = q.column.split(".")[-1]
        same += fk_name == pk_name or fk_name.endswith(f"_{pk_name}")
    assert same == len(spec.queries)


def test_deterministic():
    a, _ = build_spider_spec(rows_scale=0.01, seed=23)
    b, _ = build_spider_spec(rows_scale=0.01, seed=23)
    assert a.tables == b.tables
    assert a.queries == b.queries


def test_size_scale(spec):
    half, _ = build_spider_spec(rows_scale=0.01, size_scale=0.5)
    assert half.n_tables < spec.n_tables
    assert len(half.queries) < len(spec.queries)


def test_pk_domains_unique_within_db(spec):
    seen: dict[str, set[str]] = {}
    for q in spec.queries:
        for a in q.answers:
            db = a.split(".")[0]
            dom = spec.column_spec(a).domain
            seen.setdefault(db, set()).add(dom)
    # Parents within a db have distinct domains (by construction).
    for t in spec.tables:
        doms = [
            c.domain for c in t.columns
            if c.kind == "entity" and c.pool_hi == pytest.approx(0.85)
        ]
        assert len(doms) == len(set(doms))
