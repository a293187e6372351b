"""NextiaJD-lite: synthetic re-creations of the four NextiaJD testbeds.

The real testbeds (Flores et al., EDBT 2021) are Kaggle/OpenML file
collections binned by size; offline we rebuild their *shape* from
Table 1 of the paper — table/column/query counts per testbed, with row
counts scaled by ``rows_scale`` (benchmarks use a scale that preserves
the ~15x S→M average-row ratio the paper's efficiency claims rest on).

Join structure: each testbed plants ``join groups`` — sets of columns
spread over distinct tables/databases that draw from overlapping slices
of one entity domain, each rendered in a different surface format. Group
members are the queries; ground truth is *not* taken from the generator
but computed by the NextiaJD-style containment labeler
(:mod:`repro.corpus.ground_truth`) over realized data, exactly as the
original testbeds were labeled. Each group also gets a same-domain
"hard negative" column with a (near-)disjoint pool slice: embedding-
similar but not joinable — the columns that keep embedding precision
honest. The remaining columns are numeric/date/id/text distractors.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.corpus.domains import DomainUniverse, default_universe
from repro.corpus.ground_truth import build_queries
from repro.corpus.tablegen import ColumnSpec, CorpusSpec, TableSpec, Warehouse

# Column-name synonym sets per domain kind — fodder for D3L's
# column-name-similarity signal (synonyms share q-grams unevenly).
_NAME_SYNONYMS = {
    "company": ["company", "company_name", "org_name", "account", "firm", "vendor"],
    "geo": ["location", "region_name", "place", "geo_area", "territory", "zone"],
    "person": ["full_name", "person", "contact_name", "owner", "member", "customer"],
    "product": ["product", "item_name", "product_name", "sku_label", "goods", "article"],
    "finance": ["security", "asset_name", "instrument", "fund_name", "symbol", "ticker_name"],
    "usage": ["service", "host_name", "endpoint", "resource", "node_name", "process"],
}

_MEMBER_FORMATS = ["identity", "upper", "lower", "snake", "dashed"]


@dataclass(frozen=True)
class TestbedConfig:
    n_tables: int
    n_cols: int
    avg_rows: int  # paper-scale average rows (scaled by rows_scale)
    n_query_members: int  # paper's #Queries target
    group_size: tuple[int, int]
    n_dbs: int


TESTBEDS: dict[str, TestbedConfig] = {
    "XS": TestbedConfig(28, 257, 1_938, 35, (3, 5), 6),
    "S": TestbedConfig(46, 2_553, 209_646, 177, (3, 7), 10),
    "M": TestbedConfig(46, 1_067, 3_175_904, 188, (4, 8), 10),
    "L": TestbedConfig(19, 541, 12_288_165, 92, (3, 7), 5),
}


def _draw_group_sizes(
    g: np.random.Generator, target_members: int, lo: int, hi: int
) -> list[int]:
    sizes: list[int] = []
    remaining = target_members
    while remaining > 0:
        s = int(g.integers(lo, hi + 1))
        s = min(s, max(2, remaining))
        sizes.append(s)
        remaining -= s
    return sizes


def _member_slice(j: int) -> tuple[float, float]:
    """Pool slice for group member ``j`` — wide, mutually overlapping."""
    lo = 0.04 * j
    hi = min(0.85, 0.72 + 0.04 * j)
    return lo, hi


def build_testbed_spec(
    name: str,
    *,
    rows_scale: float = 0.01,
    size_scale: float = 1.0,
    universe: DomainUniverse | None = None,
    seed: int = 17,
) -> tuple[CorpusSpec, DomainUniverse]:
    """Build the (unmaterialized) spec for one testbed.

    ``rows_scale`` scales average rows; ``size_scale`` scales table /
    column / group counts (tests shrink testbeds, benchmarks keep 1.0).
    """
    cfg = TESTBEDS[name]
    if universe is None:
        universe = default_universe()
    g = np.random.default_rng(seed * 131 + len(name))

    n_tables = max(4, int(round(cfg.n_tables * size_scale)))
    n_cols_target = max(4 * n_tables, int(round(cfg.n_cols * size_scale)))
    n_members = max(4, int(round(cfg.n_query_members * size_scale)))
    avg_rows = max(20, int(cfg.avg_rows * rows_scale))

    # Per-table row counts: lognormal spread (median < mean, as in the
    # paper's size-binned file collections), renormalized to avg_rows.
    factors = g.lognormal(0.0, 0.8, n_tables)
    rows = np.maximum(10, (factors / factors.mean() * avg_rows)).astype(int)

    dbs = [f"{name.lower()}db{i}" for i in range(cfg.n_dbs)]
    table_names = [f"t{i:03d}" for i in range(n_tables)]
    table_db = {t: dbs[i % len(dbs)] for i, t in enumerate(table_names)}
    table_cols: dict[str, list[ColumnSpec]] = {t: [] for t in table_names}

    # Every table leads with a surrogate id column.
    for t in table_names:
        table_cols[t].append(ColumnSpec(name="row_id", kind="id"))

    sizes = _draw_group_sizes(g, n_members, *cfg.group_size)
    n_groups = len(sizes)
    group_domains = [
        universe.domains[int(i) % len(universe.domains)]
        for i in g.permutation(len(universe.domains))[:n_groups]
    ]

    for gi, (size, dom) in enumerate(zip(sizes, group_domains)):
        member_tables = g.choice(n_tables, size=min(size, n_tables), replace=False)
        syns = _NAME_SYNONYMS[dom.kind]
        for j, ti in enumerate(member_tables):
            t = table_names[int(ti)]
            lo, hi = _member_slice(j)
            col_name = f"{syns[j % len(syns)]}_{gi}"
            # Identity-weighted random format: some group pairs share a
            # format (syntactically joinable — Aurum can find them), most
            # differ (only semantic methods can). Mirrors real testbeds
            # where a fraction of joinable pairs are verbatim-joinable.
            fmt = str(
                g.choice(_MEMBER_FORMATS, p=[0.4, 0.15, 0.15, 0.15, 0.15])
            )
            table_cols[t].append(
                ColumnSpec(
                    name=col_name,
                    kind="entity",
                    domain=dom.name,
                    fmt=fmt,
                    group=gi,
                    pool_lo=lo,
                    pool_hi=hi,
                )
            )
        # Hard negative: same domain, disjoint slice → embedding-similar,
        # not joinable; the containment labeler will exclude it.
        hn_table = table_names[int(g.integers(0, n_tables))]
        table_cols[hn_table].append(
            ColumnSpec(
                name=f"{syns[0]}_hn{gi}",
                kind="entity",
                domain=dom.name,
                fmt=_MEMBER_FORMATS[int(g.integers(0, len(_MEMBER_FORMATS)))],
                group=None,
                pool_lo=0.88,
                pool_hi=1.0,
            )
        )

    # Distractors fill the remaining column budget.
    n_assigned = sum(len(cols) for cols in table_cols.values())
    distractor_kinds = ["numeric", "date", "id", "text", "entity"]
    di = 0
    while n_assigned < n_cols_target:
        t = table_names[di % n_tables]
        kind = distractor_kinds[di % len(distractor_kinds)]
        if kind in ("text", "entity"):
            dom = universe.domains[int(g.integers(0, len(universe.domains)))]
            # Distractor entity columns use a narrow tail slice of a
            # random domain so they rarely cross the Good threshold.
            table_cols[t].append(
                ColumnSpec(
                    name=f"{kind}_d{di}",
                    kind=kind,
                    domain=dom.name,
                    fmt="suffix_id" if kind == "entity" else "identity",
                    pool_lo=0.9,
                    pool_hi=1.0,
                )
            )
        else:
            table_cols[t].append(ColumnSpec(name=f"{kind}_d{di}", kind=kind))
        n_assigned += 1
        di += 1

    tables = [
        TableSpec(
            db=table_db[t],
            name=t,
            n_rows=int(rows[i]),
            columns=tuple(table_cols[t]),
        )
        for i, t in enumerate(table_names)
    ]
    spec = CorpusSpec(name=f"nextiajd-{name}", tables=tables, seed=seed)
    return spec, universe


def build_testbed(
    spark,
    name: str,
    *,
    rows_scale: float = 0.01,
    size_scale: float = 1.0,
    universe: DomainUniverse | None = None,
    seed: int = 17,
) -> tuple[CorpusSpec, Warehouse]:
    """Materialize a testbed and label its queries via containment."""
    spec, universe = build_testbed_spec(
        name,
        rows_scale=rows_scale,
        size_scale=size_scale,
        universe=universe,
        seed=seed,
    )
    wh = Warehouse(spark, spec, universe)
    spec.queries = build_queries(wh)
    return spec, wh
