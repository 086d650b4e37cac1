"""Dataset registry: name -> table builder."""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession

from repro.datasets.mimic import mimic_tables
from repro.datasets.ptc import ptc_tables
from repro.datasets.pte import pte_tables
from repro.datasets.tpch import tpch_tables

all_datasets = {
    "mimic3": mimic_tables,
    "pte": pte_tables,
    "ptc": ptc_tables,
    "tpch": tpch_tables,
}


def dataset_tables(
    spark: SparkSession, name: str, *, scale: float = 1.0
) -> dict[str, DataFrame]:
    """Build (and cache) the tables of one dataset at the given scale."""
    tables = all_datasets[name](spark, scale=scale)
    return {k: v.cache() for k, v in tables.items()}
