"""Reproduce §4.4: sample efficiency of the embedding approach.

Usage: ``spark-submit jobs/sample_efficiency.py [--rows-scale F]
[--bertlike]`` — sweeps sample sizes 10/100/1000/full on testbedS and
testbedM, reporting P@10 / R@10 and per-query lookup / e2e times;
``--bertlike`` adds the heavyweight-model comparison.
"""
from __future__ import annotations

import sys

sys.path.insert(0, ".")

from jobs._common import base_parser, make_context  # noqa: E402
from repro.eval import tables as T  # noqa: E402
from repro.eval.experiments import experiment_sample_efficiency  # noqa: E402


def main() -> None:
    p = base_parser(__doc__)
    p.add_argument("--bertlike", action="store_true")
    args = p.parse_args()
    ctx = make_context("sample_efficiency", args)
    df = experiment_sample_efficiency(
        ctx, max_queries=args.max_queries, include_bertlike=args.bertlike
    )
    print(T.format_markdown(df, "§4.4 sample efficiency (measured)"))
    ctx.spark.stop()


if __name__ == "__main__":
    main()
