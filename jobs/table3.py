"""Reproduce paper Table III (InFine accuracy split + time breakdowns).

Usage: python jobs/table3.py [scale]
"""
import sys

sys.path.insert(0, "jobs")
from _session import get_spark  # noqa: E402

from repro.harness.table3 import format_table3, table3_rows  # noqa: E402


def main() -> None:
    arg = sys.argv[1] if len(sys.argv) > 1 else "1.0"
    if arg == "bench":
        from repro.harness import BENCH_SCALE as scale
    else:
        scale = float(arg)
    spark = get_spark("table3")
    rows = table3_rows(spark, scale=scale)
    print(f"\n# Table III (scale={scale})\n")
    print(format_table3(rows))
    spark.stop()


if __name__ == "__main__":
    main()
