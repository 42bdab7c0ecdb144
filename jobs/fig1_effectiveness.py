"""Fig. 1 job: C(S) vs brute-force optimum on tiny graphs.

Usage: spark-submit jobs/fig1_effectiveness.py [--kmax 4] [--eps 0.2]
Writes ``results/fig1.md``.
"""
from __future__ import annotations

import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import get_spark, write_result  # noqa: E402

from repro.experiments.effectiveness import format_cfcc_table, run_fig1  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--kmax", type=int, default=4)
    ap.add_argument("--eps", type=float, default=0.2)
    args = ap.parse_args()
    spark = get_spark("fig1")
    try:
        rows = run_fig1(spark, k_max=args.kmax, eps=args.eps)
        write_result("fig1.md", format_cfcc_table(rows))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
