"""Reproduce paper Table I (base-table characteristics).

Usage: python jobs/table1.py [scale]   (default scale 1.0; paper-vs-ours
numbers are recorded in EXPERIMENTS.md)
"""
import sys

sys.path.insert(0, "jobs")
from _session import get_spark  # noqa: E402

from repro.harness.table1 import format_table1, table1_rows  # noqa: E402


def main() -> None:
    arg = sys.argv[1] if len(sys.argv) > 1 else "1.0"
    if arg == "bench":
        from repro.harness import BENCH_SCALE as scale
    else:
        scale = float(arg)
    spark = get_spark("table1")
    rows = table1_rows(spark, scale=scale)
    print(f"\n# Table I (scale={scale})\n")
    print(format_table1(rows))
    spark.stop()


if __name__ == "__main__":
    main()
