"""Reproduce Fig. 3 / Fig. 4 as a table: runtime + driver memory of
InFine vs HyFD/FUN/TANE/FastFDs over the 16 evaluation views.

Usage: python jobs/runtime_comparison.py [scale]
"""
import sys

sys.path.insert(0, "jobs")
from _session import get_spark  # noqa: E402

from repro.harness.runtime import format_runtime, runtime_rows  # noqa: E402


def main() -> None:
    arg = sys.argv[1] if len(sys.argv) > 1 else "1.0"
    if arg == "bench":
        from repro.harness import BENCH_SCALE as scale
    else:
        scale = float(arg)
    spark = get_spark("runtime")
    rows = runtime_rows(spark, scale=scale)
    print(f"\n# Runtime / memory comparison (scale={scale})\n")
    print(format_runtime(rows))
    spark.stop()


if __name__ == "__main__":
    main()
