"""Reproduce paper Table II (SPJ view characteristics).

Usage: python jobs/table2.py [scale]
"""
import sys

sys.path.insert(0, "jobs")
from _session import get_spark  # noqa: E402

from repro.harness.table2 import format_table2, table2_rows  # noqa: E402


def main() -> None:
    arg = sys.argv[1] if len(sys.argv) > 1 else "1.0"
    if arg == "bench":
        from repro.harness import BENCH_SCALE as scale
    else:
        scale = float(arg)
    spark = get_spark("table2")
    rows = table2_rows(spark, scale=scale)
    print(f"\n# Table II (scale={scale})\n")
    print(format_table2(rows))
    spark.stop()


if __name__ == "__main__":
    main()
