"""Fig. 4 job: running time vs ε for FORESTCFCM and SCHURCFCM.

Usage: spark-submit jobs/fig4_epsilon_runtime.py [--graphs a,b] [--k 10]
Writes ``results/fig4.md``.
"""
from __future__ import annotations

import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import get_spark, write_result  # noqa: E402

from repro.experiments.epsilon import format_fig4, run_fig4  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--graphs", default="road-1000,ba-2000-d8")
    ap.add_argument("--k", type=int, default=10)
    args = ap.parse_args()
    spark = get_spark("fig4")
    try:
        rows = run_fig4(spark, graphs=args.graphs.split(","), k=args.k)
        write_result("fig4.md", format_fig4(rows))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
