"""T7 (Fig. 7): per-phase summarization runtime for r2, r11, r12."""
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
    ap.add_argument("--queries", default="r2,r11,r12")
    ap.add_argument("--sizes", default="1000,10000,100000")
    ap.add_argument("--samples", default="50,100,1000")
    ap.add_argument("--k", type=int, default=3)
    args = ap.parse_args()
    spark = get_spark("t7_perf_more_queries")
    sizes = [int(x) for x in args.sizes.split(",")]
    samples = [int(x) for x in args.samples.split(",")]
    for query in args.queries.split(","):
        for qtype in (WHY, WHYNOT):
            rows = run_perf_scaling(spark, query, qtype, sizes, samples, k=args.k)
            print(f"\n== T7 {query} {qtype} ==")
            print(format_rows(rows))
    spark.stop()


if __name__ == "__main__":
    main()
