"""T9 (Fig. 9): runtime vs query complexity (joins, bound variables,
DBLP path length, TPC-H r10 bound variables)."""
from __future__ import annotations

import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_spark  # noqa: E402

from repro.experiments.common import format_rows  # noqa: E402
from repro.experiments.query_complexity import (  # noqa: E402
    run_bound_vars,
    run_dblp_hops,
    run_join_scaling,
    run_tpch_bound_vars,
)


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--rows", type=int, default=2000)
    ap.add_argument("--n-s", type=int, default=100)
    args = ap.parse_args()
    spark = get_spark("t9_query_complexity")
    for shape in ("chain", "star"):
        rows = run_join_scaling(
            spark, shape, [2, 4, 6], n_rows=args.rows, n_s=args.n_s
        )
        print(f"\n== T9 {shape}: varying #joins ==")
        print(format_rows(rows))
    for shape, m in (("chain", 6), ("star", 5)):
        rows = run_bound_vars(
            spark, shape, m, [0, 2, 4], n_rows=args.rows, n_s=args.n_s
        )
        print(f"\n== T9 {shape}: {m} joins, varying #bound vars ==")
        print(format_rows(rows))
    rows = run_dblp_hops(spark, [2, 3, 4], n_edges=args.rows, n_s=args.n_s)
    print("\n== T9 DBLP hops ==")
    print(format_rows(rows))
    rows = run_tpch_bound_vars(spark, [0, 4, 8, 12], n_s=args.n_s)
    print("\n== T9 TPC-H r10 bound vars ==")
    print(format_rows(rows))
    spark.stop()


if __name__ == "__main__":
    main()
