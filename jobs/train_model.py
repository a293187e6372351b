"""Train (or refresh) the web-table embedding model artifact.

Usage: ``spark-submit jobs/train_model.py [--dim D] [--n-tables N]``
Writes the ``.npz`` model under ``.cache/`` for reuse by all other jobs.
"""
from __future__ import annotations

import argparse
import sys

sys.path.insert(0, ".")

from jobs._common import make_spark  # noqa: E402
from repro.embed_model.pretrained import pretrained_model  # noqa: E402


def main() -> None:
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument("--dim", type=int, default=64)
    p.add_argument("--n-tables", type=int, default=400)
    args = p.parse_args()
    spark = make_spark("train_model")
    spark.sparkContext.setLogLevel("ERROR")
    model = pretrained_model(
        spark, dim=args.dim, n_tables=args.n_tables, refresh=True
    )
    print(f"trained model: vocab={len(model.vocab)} dim={model.dim}")
    spark.stop()


if __name__ == "__main__":
    main()
