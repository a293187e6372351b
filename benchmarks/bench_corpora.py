"""Benchmark + reproduction of Table 1 (dataset statistics).

The benchmark body is corpus construction (spec + materialization +
containment labeling) for the smallest testbed; the full Table 1 row set
is produced once and printed next to the paper's numbers.
"""
from __future__ import annotations

from repro.corpus.nextiajd import build_testbed
from repro.eval import tables as T
from repro.eval.experiments import experiment_table1


def test_table1_reproduction(benchmark, bench_ctx, capsys):
    measured = benchmark.pedantic(
        experiment_table1, args=(bench_ctx,), rounds=1, iterations=1
    )
    with capsys.disabled():
        print()
        print(T.format_markdown(T.PAPER_TABLE1, "Table 1 (paper)"))
        print(
            T.format_markdown(
                measured,
                f"Table 1 (measured, rows_scale={bench_ctx.rows_scale})",
            )
        )
    # Shape assertions: table/column counts match the paper exactly at
    # size_scale=1; queries within 30% of the paper's counts.
    paper = T.PAPER_TABLE1.set_index("dataset")
    got = measured.set_index("dataset")
    if bench_ctx.size_scale == 1.0:
        for ds in ("XS", "S", "M", "L", "Spider", "Sigma"):
            assert got.loc[ds, "n_tables"] == paper.loc[ds, "n_tables"]
            assert got.loc[ds, "n_columns"] == paper.loc[ds, "n_columns"]
        for ds in ("XS", "S", "M", "L", "Spider"):
            assert (
                abs(got.loc[ds, "n_queries"] - paper.loc[ds, "n_queries"])
                <= 0.35 * paper.loc[ds, "n_queries"]
            )


def test_bench_build_testbed_xs(benchmark, spark):
    """Corpus-construction cost for one testbed (spec → warehouse →
    labeling), the offline half of the pipeline."""
    spec, _ = benchmark.pedantic(
        build_testbed,
        args=(spark, "XS"),
        kwargs=dict(rows_scale=0.005, seed=18),
        rounds=1,
        iterations=1,
    )
    assert spec.queries
