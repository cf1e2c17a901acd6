"""T8 (Fig. 8): top-k construction runtime vs k, patterns precomputed."""
from __future__ import annotations

import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_spark  # noqa: E402

from repro.core.unify import WHY, WHYNOT  # noqa: E402
from repro.experiments.common import format_rows  # noqa: E402
from repro.experiments.topk_runtime import run_topk_runtime  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--queries", default="r1,r4")
    ap.add_argument("--size", type=int, default=10000)
    ap.add_argument("--n-s", type=int, default=1000)
    ap.add_argument("--ks", default="1,3,5,10")
    args = ap.parse_args()
    spark = get_spark("t8_topk_runtime")
    ks = [int(x) for x in args.ks.split(",")]
    for query in args.queries.split(","):
        for qtype in (WHY, WHYNOT):
            rows = run_topk_runtime(
                spark, query, qtype, args.size, args.n_s, ks
            )
            print(f"\n== T8 {query} {qtype} ==")
            print(format_rows(rows))
    spark.stop()


if __name__ == "__main__":
    main()
