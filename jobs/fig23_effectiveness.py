"""Figs. 2–3 job: C(S) trajectories of all algorithms + heuristics.

Usage: spark-submit jobs/fig23_effectiveness.py [--graphs a,b] [--k 20]
Writes ``results/fig23.md``.
"""
from __future__ import annotations

import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import get_spark, write_result  # noqa: E402

from repro.experiments.effectiveness import format_cfcc_table, run_fig23  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--graphs", default="road-1000,ba-2000-d8")
    ap.add_argument("--k", type=int, default=20)
    ap.add_argument("--eps", type=float, default=0.2)
    args = ap.parse_args()
    spark = get_spark("fig23")
    try:
        rows = run_fig23(spark, graphs=args.graphs.split(","), k=args.k, eps=args.eps)
        write_result("fig23.md", format_cfcc_table(rows))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
