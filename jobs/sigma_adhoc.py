"""Reproduce §4.3.3: ad-hoc discovery on Sigma-lite (Joey's narrative).

Usage: ``spark-submit jobs/sigma_adhoc.py [--rows-scale F]`` — indexes
Sigma-lite and prints WarpGate's top-k recommendations for the
``salesforce.account.name`` query (and the other ad-hoc queries).
"""
from __future__ import annotations

import sys

sys.path.insert(0, ".")

from jobs._common import base_parser, make_context  # noqa: E402
from repro.core.warpgate import WarpGate  # noqa: E402
from repro.corpus.sigma import build_sigma  # noqa: E402


def main() -> None:
    args = base_parser(__doc__).parse_args()
    ctx = make_context("sigma_adhoc", args)
    spec, wh = build_sigma(
        ctx.spark, rows_scale=args.rows_scale, size_scale=args.size_scale
    )
    wg = WarpGate(model=ctx.model)
    wg.build_index(wh)
    for q in spec.queries:
        results, timing = wg.query(q.column, k=5)
        print(f"\nquery {q.column}  (e2e {timing.e2e_s*1000:.1f} ms)")
        for r in results:
            print(f"  {r.score:.3f}  {r.col_id}")
    ctx.spark.stop()


if __name__ == "__main__":
    main()
