"""Unit tests for precision/recall@k."""
from __future__ import annotations

import pytest

from repro.corpus.tablegen import QuerySpec
from repro.eval.metrics import pr_curve, precision_at_k, recall_at_k

ANS = frozenset({"a", "b", "c"})


@pytest.mark.parametrize(
    "retrieved,k,expected",
    [
        (["a", "b", "x"], 3, 2 / 3),
        (["a", "b", "x"], 1, 1.0),
        (["x", "y"], 2, 0.0),
        (["a"], 5, 1 / 5),
        ([], 3, 0.0),
    ],
)
def test_precision_at_k(retrieved, k, expected):
    assert precision_at_k(retrieved, ANS, k) == pytest.approx(expected)


@pytest.mark.parametrize(
    "retrieved,k,expected",
    [
        (["a", "b", "x"], 3, 2 / 3),
        (["a", "b", "c"], 3, 1.0),
        (["x"], 1, 0.0),
        (["a", "b", "c", "d"], 2, 2 / 3),
        ([], 3, 0.0),
    ],
)
def test_recall_at_k(retrieved, k, expected):
    assert recall_at_k(retrieved, ANS, k) == pytest.approx(expected)


def test_recall_empty_answers():
    assert recall_at_k(["a"], frozenset(), 1) == 0.0


def test_precision_k_zero():
    assert precision_at_k(["a"], ANS, 0) == 0.0


def test_pr_curve_averages():
    queries = [
        QuerySpec(column="q1", answers=frozenset({"a"})),
        QuerySpec(column="q2", answers=frozenset({"b", "c"})),
    ]
    results = {"q1": ["a", "x"], "q2": ["x", "b"]}
    pts = pr_curve(results, queries, [1, 2])
    assert pts[0].k == 1
    assert pts[0].precision == pytest.approx((1.0 + 0.0) / 2)
    assert pts[0].recall == pytest.approx((1.0 + 0.0) / 2)
    assert pts[1].precision == pytest.approx((0.5 + 0.5) / 2)
    assert pts[1].recall == pytest.approx((1.0 + 0.5) / 2)


def test_pr_curve_missing_query_penalized():
    queries = [QuerySpec(column="q1", answers=frozenset({"a"}))]
    pts = pr_curve({}, queries, [1])
    assert pts[0].precision == 0.0 and pts[0].recall == 0.0


def test_pr_curve_monotone_recall():
    queries = [QuerySpec(column="q", answers=frozenset({"a", "b"}))]
    results = {"q": ["x", "a", "y", "b"]}
    pts = pr_curve(results, queries, [1, 2, 3, 4])
    recalls = [p.recall for p in pts]
    assert recalls == sorted(recalls)
