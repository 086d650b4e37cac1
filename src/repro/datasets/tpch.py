"""TPC-H-lite dataset assembly (dbgen substitute, see DESIGN.md).

Wraps the generators in :mod:`repro.synth_data` (customer/orders/
lineitem/part provided; supplier/nation/region/partsupp added) into one
table dict. ``scale`` here multiplies a base SF of 0.001, i.e.
``scale=1`` ≈ 6k lineitem rows for tests and ``scale=10`` ≈ 60k rows for
benchmarks.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession

from repro import synth_data as S

BASE_SF = 0.001
DEFAULT_SCALE = 1.0


def tpch_tables(
    spark: SparkSession, *, scale: float = DEFAULT_SCALE, seed: int = 0
) -> dict[str, DataFrame]:
    sf = BASE_SF * scale
    li = S.lineitem_suppkey(S.lineitem(spark, sf=sf, seed=seed), sf=sf)
    return {
        "lineitem": li,
        "orders": S.orders(spark, sf=sf, seed=seed + 1),
        "customer": S.customer(spark, sf=sf, seed=seed + 2),
        "part": S.part(spark, sf=sf, seed=seed + 5),
        "supplier": S.supplier(spark, sf=sf, seed=seed + 6),
        "nation": S.nation(spark, seed=seed + 7),
        "region": S.region(spark, seed=seed + 8),
        "partsupp": S.partsupp(spark, sf=sf, seed=seed + 9),
    }
