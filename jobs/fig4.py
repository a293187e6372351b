"""Reproduce Fig. 4 (as tables): top-k precision/recall on testbedS,
testbedM, and Spider-lite for all three systems.

Usage: ``spark-submit jobs/fig4.py [--rows-scale F] [--datasets S M spider]``
"""
from __future__ import annotations

import sys

sys.path.insert(0, ".")

from jobs._common import base_parser, make_context  # noqa: E402
from repro.eval import tables as T  # noqa: E402
from repro.eval.experiments import experiment_fig4  # noqa: E402


def main() -> None:
    p = base_parser(__doc__)
    p.add_argument("--datasets", nargs="+", default=["S", "M", "spider"])
    args = p.parse_args()
    ctx = make_context("fig4", args)
    for ds in args.datasets:
        table, _ = experiment_fig4(ctx, ds, max_queries=args.max_queries)
        print(T.format_markdown(table, f"Fig 4 — {ds} (P@k / R@k)"))
    ctx.spark.stop()


if __name__ == "__main__":
    main()
