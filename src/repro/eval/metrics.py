"""Top-k precision and recall (§4.2).

At each k, precision = |top-k ∩ answers| / k and recall =
|top-k ∩ answers| / |answers|, averaged over all queries of a dataset —
the paper's Fig. 4 metrics.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.corpus.tablegen import QuerySpec


@dataclass(frozen=True)
class PRPoint:
    k: int
    precision: float
    recall: float


def precision_at_k(retrieved: list[str], answers: frozenset[str], k: int) -> float:
    top = retrieved[:k]
    if k == 0:
        return 0.0
    return len([c for c in top if c in answers]) / k


def recall_at_k(retrieved: list[str], answers: frozenset[str], k: int) -> float:
    if not answers:
        return 0.0
    top = retrieved[:k]
    return len([c for c in top if c in answers]) / len(answers)


def pr_curve(
    results: dict[str, list[str]],
    queries: list[QuerySpec],
    ks: list[int],
) -> list[PRPoint]:
    """Average P@k / R@k over all queries, per k.

    ``results`` maps query col_id → ranked retrieved col_ids. Queries
    missing from ``results`` count as empty retrievals (a system that
    returns nothing is penalized, not skipped).
    """
    out = []
    for k in ks:
        ps, rs = [], []
        for q in queries:
            retrieved = results.get(q.column, [])
            ps.append(precision_at_k(retrieved, q.answers, k))
            rs.append(recall_at_k(retrieved, q.answers, k))
        out.append(
            PRPoint(k=k, precision=float(np.mean(ps)), recall=float(np.mean(rs)))
        )
    return out
