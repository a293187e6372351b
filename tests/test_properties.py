"""Property-based tests (hypothesis) for the pure-math building blocks."""
from __future__ import annotations

import numpy as np
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.baselines.d3l import value_pattern
from repro.baselines.minhash import est_jaccard, minhash_signature, permutation_params
from repro.core.simhash import bit_agreement_probability
from repro.embed_model.model import cosine
from repro.embed_model.tokenizer import normalize, tokenize

_text = st.text(
    alphabet=st.characters(min_codepoint=32, max_codepoint=126), max_size=40
)


@given(_text)
@settings(max_examples=200, deadline=None)
def test_tokenize_always_lowercase_alnum(s):
    for tok in tokenize(s):
        assert tok == tok.lower()
        assert tok.startswith("<num:") or tok.isalnum()


@given(_text)
@settings(max_examples=200, deadline=None)
def test_normalize_case_invariant(s):
    assert normalize(s) == normalize(s.upper()) == normalize(s.lower())


@given(_text, _text)
@settings(max_examples=100, deadline=None)
def test_normalize_concat_separator_invariant(a, b):
    assert normalize(f"{a} {b}") == normalize(f"{a}-{b}") == normalize(f"{a}_{b}")


@given(st.floats(min_value=-1.0, max_value=1.0))
@settings(max_examples=100, deadline=None)
def test_bit_agreement_in_unit_interval(c):
    p = bit_agreement_probability(c)
    assert 0.0 <= p <= 1.0


@given(_text)
@settings(max_examples=200, deadline=None)
def test_value_pattern_collapses_runs(s):
    p = value_pattern(s)
    assert all(a != b for a, b in zip(p, p[1:]))
    assert set(p) <= set("Aa9sp")


@given(
    st.lists(st.text(min_size=1, max_size=8), min_size=1, max_size=30),
    st.lists(st.text(min_size=1, max_size=8), min_size=1, max_size=30),
)
@settings(max_examples=50, deadline=None)
def test_minhash_symmetric_and_bounded(xs, ys):
    a, b = permutation_params(64, seed=3)
    sx = minhash_signature(xs, a, b)
    sy = minhash_signature(ys, a, b)
    if sx is None or sy is None:
        return
    j1, j2 = est_jaccard(sx, sy), est_jaccard(sy, sx)
    assert j1 == j2
    assert 0.0 <= j1 <= 1.0
    if set(map(str, xs)) == set(map(str, ys)):
        assert j1 == 1.0


@given(
    st.lists(
        st.floats(min_value=-5, max_value=5, allow_nan=False), min_size=4, max_size=4
    ),
    st.lists(
        st.floats(min_value=-5, max_value=5, allow_nan=False), min_size=4, max_size=4
    ),
)
@settings(max_examples=100, deadline=None)
def test_cosine_bounded_and_symmetric(xs, ys):
    a, b = np.array(xs), np.array(ys)
    c = cosine(a, b)
    assert -1.0001 <= c <= 1.0001
    assert c == cosine(b, a)
