#!/usr/bin/env python
"""Generate WatDiv-lite and load it into a PRoST store on disk.

Usage::

    spark-submit jobs/load_watdiv.py --scale 1.0 --out /tmp/prost_store
"""
from __future__ import annotations

import argparse
import time

from _session import get_spark

from repro.bench.harness import dir_size
from repro.core.prost import Prost
from repro.rdf.watdiv import watdiv


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--seed", type=int, default=42)
    ap.add_argument("--out", required=True)
    args = ap.parse_args()

    spark = get_spark("prost-load")
    triples = watdiv(spark, scale=args.scale, seed=args.seed)
    n = triples.count()
    t0 = time.perf_counter()
    Prost.load(spark, triples, path=args.out)
    secs = time.perf_counter() - t0
    print(f"loaded {n} triples into {args.out} in {secs:.1f}s "
          f"({dir_size(args.out) / 1e6:.1f} MB on disk)")
    spark.stop()


if __name__ == "__main__":
    main()
