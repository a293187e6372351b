"""Tests for the NextiaJD-lite testbed generators."""
from __future__ import annotations

import numpy as np
import pytest

from repro.corpus.nextiajd import (
    TESTBEDS,
    _draw_group_sizes,
    _member_slice,
    build_testbed_spec,
)


@pytest.mark.parametrize("name", list(TESTBEDS))
def test_spec_shape_matches_paper(name):
    """Table/column counts track the paper's Table 1 at size_scale=1."""
    cfg = TESTBEDS[name]
    spec, _ = build_testbed_spec(name, rows_scale=0.001)
    assert spec.n_tables == cfg.n_tables
    # Column budget is filled to the target exactly (distractor loop).
    assert spec.n_columns == cfg.n_cols
    # avg rows track the scaled target, subject to the generator's
    # 20-row average / 10-row per-table floors at tiny scales.
    target = max(20, cfg.avg_rows * 0.001)
    assert spec.avg_rows == pytest.approx(target, rel=0.35)


@pytest.mark.parametrize("name", list(TESTBEDS))
def test_group_membership_tracks_query_target(name):
    cfg = TESTBEDS[name]
    spec, _ = build_testbed_spec(name, rows_scale=0.001)
    members = [
        c for t in spec.tables for c in t.columns
        if c.kind == "entity" and c.group is not None
    ]
    assert len(members) == pytest.approx(cfg.n_query_members, abs=cfg.group_size[1])


def test_spec_deterministic():
    a, _ = build_testbed_spec("XS", rows_scale=0.01, seed=4)
    b, _ = build_testbed_spec("XS", rows_scale=0.01, seed=4)
    assert a.tables == b.tables


def test_size_scale_shrinks():
    full, _ = build_testbed_spec("S", rows_scale=0.001)
    half, _ = build_testbed_spec("S", rows_scale=0.001, size_scale=0.5)
    assert half.n_tables < full.n_tables
    assert half.n_columns < full.n_columns


def test_group_members_in_distinct_tables():
    spec, _ = build_testbed_spec("S", rows_scale=0.001)
    by_group: dict[int, list[str]] = {}
    for t in spec.tables:
        for c in t.columns:
            if c.kind == "entity" and c.group is not None:
                by_group.setdefault(c.group, []).append(t.table_id)
    for grp, tabs in by_group.items():
        assert len(tabs) == len(set(tabs)), f"group {grp} reuses a table"


def test_groups_use_distinct_domains():
    spec, _ = build_testbed_spec("M", rows_scale=0.0001)
    dom_of_group: dict[int, set[str]] = {}
    for t in spec.tables:
        for c in t.columns:
            if c.group is not None:
                dom_of_group.setdefault(c.group, set()).add(c.domain)
    # One domain per group, and no two groups share a domain.
    assert all(len(d) == 1 for d in dom_of_group.values())
    all_doms = [next(iter(d)) for d in dom_of_group.values()]
    assert len(all_doms) == len(set(all_doms))


def test_every_group_has_hard_negative():
    spec, _ = build_testbed_spec("XS", rows_scale=0.01)
    group_domains = {
        c.domain for t in spec.tables for c in t.columns if c.group is not None
    }
    hn_domains = {
        c.domain
        for t in spec.tables
        for c in t.columns
        if c.kind == "entity" and c.group is None and c.pool_lo >= 0.85
    }
    assert group_domains <= hn_domains | group_domains
    assert len(hn_domains & group_domains) == len(group_domains)


def test_member_slice_overlap_generous():
    lo0, hi0 = _member_slice(0)
    lo5, hi5 = _member_slice(5)
    overlap = min(hi0, hi5) - max(lo0, lo5)
    assert overlap / (hi0 - lo0) >= 0.6


def test_draw_group_sizes_sums_to_target():
    g = np.random.default_rng(0)
    sizes = _draw_group_sizes(g, 177, 3, 7)
    assert sum(sizes) >= 177
    assert sum(sizes) <= 177 + 7
    assert all(2 <= s <= 7 for s in sizes)


def test_row_counts_min_bound():
    spec, _ = build_testbed_spec("XS", rows_scale=1e-9)
    assert all(t.n_rows >= 10 for t in spec.tables)


def test_xs_corpus_queries_close_to_paper(xs_corpus):
    """End-to-end: labeled query count and answer sizes near Table 1."""
    spec, _ = xs_corpus
    cfg = TESTBEDS["XS"]
    assert len(spec.queries) >= 0.7 * cfg.n_query_members
    assert 1.5 <= spec.avg_answers <= 4.5


def test_xs_formats_vary_within_groups(xs_corpus):
    spec, _ = xs_corpus
    fmts_by_group: dict[int, set[str]] = {}
    for t in spec.tables:
        for c in t.columns:
            if c.group is not None:
                fmts_by_group.setdefault(c.group, set()).add(c.fmt)
    n_multi = sum(1 for f in fmts_by_group.values() if len(f) > 1)
    assert n_multi >= 0.5 * len(fmts_by_group)
