"""Table II job: running times of EXACT / APPROX / FORESTCFCM / SCHURCFCM.

Usage:
    spark-submit jobs/table2.py [--graphs name1,name2] [--k 20] [--tiers small,medium]

Writes ``results/table2.md``.
"""
from __future__ import annotations

import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import get_spark, write_result  # noqa: E402

from repro.experiments.graphs import SUITE  # noqa: E402
from repro.experiments.table2 import format_table2, run_table2  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--graphs", default=None, help="comma-separated suite names")
    ap.add_argument("--tiers", default="small,medium,large")
    ap.add_argument("--k", type=int, default=20)
    ap.add_argument("--exact-limit", type=int, default=2500)
    ap.add_argument("--approx-limit", type=int, default=13000)
    args = ap.parse_args()

    if args.graphs:
        names = args.graphs.split(",")
    else:
        tiers = set(args.tiers.split(","))
        names = [n for n, s in SUITE.items() if s.tier in tiers]

    spark = get_spark("table2")
    try:
        rows = run_table2(
            spark,
            graph_names=names,
            k=args.k,
            exact_limit=args.exact_limit,
            approx_limit=args.approx_limit,
        )
        write_result("table2.md", format_table2(rows))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
