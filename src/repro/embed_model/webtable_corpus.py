"""Synthetic web-table corpus for training the embedding model.

The paper uses Web Table Embeddings pre-trained on the Dresden Web Table
Corpus (~100M tables from Common Crawl). Offline, we build the closest
synthetic equivalent: a corpus of small "web tables" whose columns draw
values from the shared :class:`~repro.corpus.domains.DomainUniverse`.
The property the downstream system relies on — *tokens of the same
semantic domain co-occur within web-table columns, so their embeddings
cluster* — is reproduced by construction. Noise tables with random
cross-domain vocabulary keep the co-occurrence statistics from being
trivially block-diagonal.

Output is a long-format Spark DataFrame ``(table_id, col_idx, value)``
— one row per cell — which is what the trainer consumes.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.corpus.domains import FORMAT_NAMES, DomainUniverse, format_values


def generate_webtable_cells(
    universe: DomainUniverse,
    *,
    n_tables: int = 400,
    rows_per_table: tuple[int, int] = (30, 120),
    cols_per_table: tuple[int, int] = (2, 5),
    noise_frac: float = 0.15,
    seed: int = 7,
) -> pd.DataFrame:
    """Pandas cells frame ``(table_id, col_idx, value)`` for the corpus.

    Each non-noise column picks a domain and a formatting variant, then
    samples entities with repetition (web tables repeat popular
    entities). Noise columns mix entities across random domains.
    """
    g = np.random.default_rng(seed)
    recs: list[tuple[int, int, str]] = []
    n_domains = len(universe.domains)
    for t in range(n_tables):
        n_rows = int(g.integers(*rows_per_table))
        n_cols = int(g.integers(*cols_per_table))
        for c in range(n_cols):
            if g.random() < noise_frac:
                # Noise column: values from several domains.
                picks = g.integers(0, n_domains, n_rows)
                vals = [
                    str(g.choice(universe.domains[int(p)].pool())) for p in picks
                ]
            else:
                dom = universe.domains[int(g.integers(0, n_domains))]
                fmt = str(g.choice(FORMAT_NAMES))
                pool = dom.pool()
                # Zipf-flavoured sampling: web tables repeat head entities.
                idx = g.zipf(1.3, size=n_rows) % len(pool)
                vals = format_values([pool[int(i)] for i in idx], fmt)
            recs.extend((t, c, v) for v in vals)
    return pd.DataFrame(recs, columns=["table_id", "col_idx", "value"])


def webtable_corpus_df(
    spark: SparkSession,
    universe: DomainUniverse,
    **kwargs,
) -> DataFrame:
    """Spark long-format cells DataFrame for the training corpus."""
    pdf = generate_webtable_cells(universe, **kwargs)
    return spark.createDataFrame(pdf)
