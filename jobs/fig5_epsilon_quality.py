"""Fig. 5 job: relative difference vs EXACT across ε.

Usage: spark-submit jobs/fig5_epsilon_quality.py [--graphs a,b] [--k 10]
Writes ``results/fig5.md``.
"""
from __future__ import annotations

import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import get_spark, write_result  # noqa: E402

from repro.experiments.effectiveness import format_fig5, run_fig5  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--graphs", default="road-1000,ba-2000-d8")
    ap.add_argument("--k", type=int, default=10)
    args = ap.parse_args()
    spark = get_spark("fig5")
    try:
        rows = run_fig5(spark, graphs=args.graphs.split(","), k=args.k)
        write_result("fig5.md", format_fig5(rows))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
