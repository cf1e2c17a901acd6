"""T12 (Fig. 12): PUG-Summ vs Artemis (12a) and vs single-derivation (12b)."""
from __future__ import annotations

import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_spark  # noqa: E402

from repro.experiments.common import format_rows  # noqa: E402
from repro.experiments.comparison import (  # noqa: E402
    run_artemis_comparison,
    run_single_derivation_comparison,
)


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--artemis-sizes", default="200,500,1400,5000")
    ap.add_argument("--single-sizes", default="1000,10000,100000")
    args = ap.parse_args()
    spark = get_spark("t12_comparison")
    rows = run_artemis_comparison(
        spark, [int(x) for x in args.artemis_sizes.split(",")]
    )
    print("\n== T12a PUG-Summ vs Artemis (CrimeDesc) ==")
    print(format_rows(rows))
    rows = run_single_derivation_comparison(
        spark, [int(x) for x in args.single_sizes.split(",")]
    )
    print("\n== T12b PUG-Summ vs single-derivation (r1) ==")
    print(format_rows(rows))
    spark.stop()


if __name__ == "__main__":
    main()
