"""Reproduce Table 1: dataset statistics of all evaluation corpora.

Usage: ``spark-submit jobs/table1.py [--rows-scale F] [--size-scale F]``
Prints measured stats next to the paper's numbers, plus the §5.1-style
Sigma-lite warehouse shape statistics.
"""
from __future__ import annotations

import sys

sys.path.insert(0, ".")  # allow running from the repo root

from jobs._common import base_parser, make_context  # noqa: E402
from repro.eval import tables as T  # noqa: E402
from repro.eval.experiments import (  # noqa: E402
    experiment_sigma_shape,
    experiment_table1,
)


def main() -> None:
    args = base_parser(__doc__).parse_args()
    ctx = make_context("table1", args)
    measured = experiment_table1(ctx)
    print(T.format_markdown(T.PAPER_TABLE1, "Table 1 (paper)"))
    print(T.format_markdown(measured, f"Table 1 (measured, rows_scale={ctx.rows_scale})"))
    shape = experiment_sigma_shape(ctx)
    print("Sigma-lite warehouse shape (§5.1 analogue):", shape)
    ctx.spark.stop()


if __name__ == "__main__":
    main()
