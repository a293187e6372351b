"""Tests for the heavyweight BERT-like model (§4.4 comparison)."""
from __future__ import annotations

import time

import numpy as np
import pytest

from repro.embed_model.bertlike import BertLikeModel
from repro.embed_model.model import cosine


@pytest.fixture(scope="module")
def bert(model):
    return BertLikeModel(base=model)


def test_dim_matches_base(bert, model):
    assert bert.dim == model.dim


def test_embedding_normalized(bert):
    v = bert.embed_values(["Acme Corp", "Beta Inc"])
    assert np.isclose(np.linalg.norm(v), 1.0, atol=1e-5)


def test_empty_values(bert):
    assert bert.embed_values([]) is None
    assert bert.embed_values([None, ""]) is None


def test_deterministic(bert):
    a = bert.embed_values(["Acme Corp", "Beta Inc"])
    b = bert.embed_values(["Acme Corp", "Beta Inc"])
    assert np.allclose(a, b)


def test_dedup_semantics(bert):
    once = bert.embed_values(["Acme Corp", "Beta Inc"])
    dup = bert.embed_values(["Acme Corp"] * 50 + ["Beta Inc"])
    assert np.allclose(once, dup, atol=1e-5)


def test_quality_parity_with_base(bert, model, universe):
    """§4.4: BERT-like embeddings rank domains like the base model —
    same-domain cosine high, cross-domain low."""
    from repro.corpus.domains import format_values

    d0 = universe.domains[0]
    far = next(d for d in universe.domains if d.kind != d0.kind)
    a = bert.embed_values(format_values(d0.entities[:40], "identity"))
    b = bert.embed_values(format_values(d0.entities[20:60], "snake"))
    c = bert.embed_values(format_values(far.entities[:40], "upper"))
    assert cosine(a, b) > 0.8
    assert cosine(a, b) > cosine(a, c) + 0.25


def test_close_to_base_embedding(bert, model):
    vals = ["Acme Corp", "Beta Inc", "Gamma LLC"]
    assert cosine(bert.embed_values(vals), model.embed_values(vals)) > 0.9


def test_inference_cost_multiple(bert, model, universe):
    """§4.4: the heavyweight model is several times slower per column
    (the paper reports ~10x end-to-end without sampling)."""
    vals = [e for e in universe.domains[0].entities[:300]]
    # Warm both paths once (JIT-free, but caches page in).
    model.embed_values(vals[:10]), bert.embed_values(vals[:10])
    t0 = time.perf_counter()
    for _ in range(3):
        model.embed_values(vals)
    base_t = time.perf_counter() - t0
    t0 = time.perf_counter()
    for _ in range(3):
        bert.embed_values(vals)
    bert_t = time.perf_counter() - t0
    assert bert_t > 3 * base_t, (base_t, bert_t)
