"""Reproduce Table 2: end-to-end query response time (k=10).

Usage: ``spark-submit jobs/table2.py [--rows-scale F] [--max-queries N]``
Runs Aurum, D3L, and WarpGate over NextiaJD-lite testbedS and testbedM
at full values and prints seconds/query (WarpGate's index-lookup share
in a separate column, as in the paper's parentheses).
"""
from __future__ import annotations

import sys

sys.path.insert(0, ".")

from jobs._common import base_parser, make_context  # noqa: E402
from repro.eval import tables as T  # noqa: E402
from repro.eval.experiments import experiment_table2  # noqa: E402


def main() -> None:
    args = base_parser(__doc__).parse_args()
    ctx = make_context("table2", args)
    measured, _ = experiment_table2(ctx, max_queries=args.max_queries)
    print(T.format_markdown(T.PAPER_TABLE2, "Table 2 (paper, seconds/query)"))
    print(
        T.format_markdown(
            measured, f"Table 2 (measured, rows_scale={ctx.rows_scale})"
        )
    )
    ctx.spark.stop()


if __name__ == "__main__":
    main()
