"""The WarpGate system: indexing pipeline + search pipeline (§3).

Indexing: warehouse columns → (sampled) long cells frame → distributed
column embedding → distributed SimHash signatures → in-memory banded LSH
index.

Search: the query column is pulled out of the warehouse (``load``
phase), then handed to the index, which embeds it and probes the LSH
buckets (``lookup`` phase — per the paper's timing decomposition, index
lookup covers everything after data loading: embedding inference of the
query plus the banded probe and cosine re-rank; §4.2 defines end-to-end
response time as loading + inference + lookup). Timings for both phases
are returned with every query so the evaluation harness can reproduce
Table 2's "e2e (lookup)" cells.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np

from repro.core.embedding import embed_columns_df
from repro.core.sampling import load_column
from repro.core.simhash import SearchResult, SimHashIndex
from repro.corpus.tablegen import Warehouse
from repro.embed_model.model import EmbeddingModel


@dataclass
class WarpGateConfig:
    """Tunables, defaults per the paper's experiment setup."""

    n_bits: int = 128
    threshold: float = 0.7  # SimHash LSH similarity threshold (§4.3)
    sample: int | None = None  # rows per column; None = full values
    strategy: str = "head"
    k: int = 10
    seed: int = 99


@dataclass
class QueryTiming:
    load_s: float
    lookup_s: float

    @property
    def e2e_s(self) -> float:
        return self.load_s + self.lookup_s


@dataclass
class WarpGate:
    """One indexed warehouse + its search entry point."""

    model: EmbeddingModel | object  # EmbeddingModel or BertLikeModel
    config: WarpGateConfig = field(default_factory=WarpGateConfig)
    index: SimHashIndex | None = None
    _warehouse: Warehouse | None = None
    index_build_s: float = 0.0

    def build_index(self, warehouse: Warehouse) -> SimHashIndex:
        """Run the indexing pipeline over every column of the warehouse."""
        t0 = time.perf_counter()
        cells = warehouse.cells_long_df(sample=self.config.sample)
        emb_df = embed_columns_df(warehouse.spark, cells, self._as_embedder())
        self.index = SimHashIndex.build_from_df(
            emb_df,
            dim=self._dim(),
            n_bits=self.config.n_bits,
            threshold=self.config.threshold,
            seed=self.config.seed,
        )
        self._warehouse = warehouse
        self.index_build_s = time.perf_counter() - t0
        return self.index

    def _dim(self) -> int:
        return int(self.model.dim)

    def _as_embedder(self) -> EmbeddingModel:
        """The model used for *corpus* embedding.

        BertLike models embed columns through their own ``embed_values``
        too, but the distributed pipeline needs a picklable object — both
        model classes satisfy that, so pass through unchanged.
        """
        return self.model  # type: ignore[return-value]

    def query(
        self, col_id: str, *, k: int | None = None
    ) -> tuple[list[SearchResult], QueryTiming]:
        """Top-k semantic join discovery for one query column."""
        assert self.index is not None and self._warehouse is not None, (
            "build_index() must run before query()"
        )
        k = k or self.config.k
        t0 = time.perf_counter()
        values = load_column(
            self._warehouse,
            col_id,
            sample=self.config.sample,
            strategy=self.config.strategy,
        )
        t1 = time.perf_counter()
        results = self.lookup(values, k=k, exclude={col_id})
        t2 = time.perf_counter()
        return results, QueryTiming(load_s=t1 - t0, lookup_s=t2 - t1)

    def lookup(
        self, values: list, *, k: int, exclude: set[str] | None = None
    ) -> list[SearchResult]:
        """Index lookup: embed raw values, probe LSH bands, re-rank."""
        vec = self.model.embed_values(values)
        if vec is None:
            return []
        return self.index.query(np.asarray(vec), k, exclude=exclude)
