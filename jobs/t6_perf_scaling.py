"""T6 (Fig. 6): per-phase runtime of why / why-not summarization for
r1, r3, r4, varying dataset and sample size.

Usage: spark-submit jobs/t6_perf_scaling.py [--sizes 1000,10000] ...
"""
from __future__ import annotations

import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_spark  # noqa: E402

from repro.core.unify import WHY, WHYNOT  # noqa: E402
from repro.experiments.common import format_rows  # noqa: E402
from repro.experiments.perf_scaling import run_perf_scaling  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--queries", default="r1,r3,r4")
    ap.add_argument("--sizes", default="1000,10000,100000")
    ap.add_argument("--samples", default="50,100,1000")
    ap.add_argument("--k", type=int, default=3)
    ap.add_argument("--full", action="store_true", help="include FULL rows")
    args = ap.parse_args()
    spark = get_spark("t6_perf_scaling")
    sizes = [int(x) for x in args.sizes.split(",")]
    samples = [int(x) for x in args.samples.split(",")]
    for query in args.queries.split(","):
        for qtype in (WHY, WHYNOT):
            rows = run_perf_scaling(
                spark, query, qtype, sizes, samples, k=args.k,
                include_full=args.full,
            )
            print(f"\n== T6 {query} {qtype} ==")
            print(format_rows(rows))
    spark.stop()


if __name__ == "__main__":
    main()
