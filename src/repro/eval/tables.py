"""Printable reproductions of the paper's evaluation tables.

Each function returns a pandas DataFrame whose rows mirror what the
paper reports, so EXPERIMENTS.md can diff paper vs measured directly.
Figures 4(a–c) are reported as P/R@k tables (figures are out of scope).
"""
from __future__ import annotations

import pandas as pd

from repro.corpus.tablegen import CorpusSpec
from repro.eval.harness import RunResult
from repro.eval.metrics import PRPoint

PAPER_TABLE1 = pd.DataFrame(
    [
        ("XS", 28, 257, 1_938, 35, 2.8),
        ("S", 46, 2_553, 209_646, 177, 3.6),
        ("M", 46, 1_067, 3_175_904, 188, 4.4),
        ("L", 19, 541, 12_288_165, 92, 3.6),
        ("Spider", 70, 429, 7_632, 60, 1.1),
        ("Sigma", 98, 1_343, 2_243_932, None, None),
    ],
    columns=["dataset", "n_tables", "n_columns", "avg_rows", "n_queries", "avg_answers"],
)

PAPER_TABLE2 = pd.DataFrame(
    [
        ("testbedS", 0.18, 4.77, 3.12, 1.04),
        ("testbedM", 0.03, 57.69, 38.73, 8.39),
    ],
    columns=["dataset", "aurum_s", "d3l_s", "warpgate_s", "warpgate_lookup_s"],
)


def table1(specs: dict[str, CorpusSpec]) -> pd.DataFrame:
    """Measured dataset statistics in the paper's Table 1 layout."""
    rows = []
    for name, spec in specs.items():
        has_gt = any(q.answers for q in spec.queries)
        rows.append(
            (
                name,
                spec.n_tables,
                spec.n_columns,
                round(spec.avg_rows),
                len(spec.queries) if has_gt else None,
                round(spec.avg_answers, 1) if has_gt else None,
            )
        )
    return pd.DataFrame(
        rows,
        columns=[
            "dataset", "n_tables", "n_columns", "avg_rows", "n_queries", "avg_answers",
        ],
    )


def table2(results: dict[str, dict[str, RunResult]]) -> pd.DataFrame:
    """Measured Table 2: e2e seconds/query at k=10 (+ WarpGate lookup).

    ``results`` maps dataset → {system name → RunResult}; system keys
    must include 'Aurum', 'D3L', and 'WarpGate'.
    """
    rows = []
    for ds, by_sys in results.items():
        wg = by_sys["WarpGate"]
        rows.append(
            (
                ds,
                round(by_sys["Aurum"].avg_e2e_s, 4),
                round(by_sys["D3L"].avg_e2e_s, 4),
                round(wg.avg_e2e_s, 4),
                round(wg.avg_lookup_s, 4),
            )
        )
    return pd.DataFrame(
        rows,
        columns=["dataset", "aurum_s", "d3l_s", "warpgate_s", "warpgate_lookup_s"],
    )


def pr_table(points: dict[str, list[PRPoint]]) -> pd.DataFrame:
    """Fig. 4 as a table: P@k / R@k per system."""
    rows = []
    for system, pts in points.items():
        for p in pts:
            rows.append((system, p.k, round(p.precision, 3), round(p.recall, 3)))
    return pd.DataFrame(rows, columns=["system", "k", "precision", "recall"])


def sample_efficiency_table(
    rows: list[tuple[str, str, float, float, float, float]]
) -> pd.DataFrame:
    """§4.4 as a table.

    ``rows``: (dataset, sample_size_label, P@10, R@10, lookup s/q, e2e s/q).
    """
    return pd.DataFrame(
        rows,
        columns=["dataset", "sample", "p_at_10", "r_at_10", "lookup_s", "e2e_s"],
    )


def format_markdown(df: pd.DataFrame, title: str) -> str:
    """Render a DataFrame as a GitHub-markdown table with a heading.

    Hand-rolled (no ``tabulate`` dependency in the offline environment).
    """
    cols = list(df.columns)
    lines = [
        "| " + " | ".join(str(c) for c in cols) + " |",
        "|" + "|".join("---" for _ in cols) + "|",
    ]
    for _, row in df.iterrows():
        lines.append(
            "| " + " | ".join("" if pd.isna(v) else str(v) for v in row) + " |"
        )
    return f"### {title}\n\n" + "\n".join(lines) + "\n"
