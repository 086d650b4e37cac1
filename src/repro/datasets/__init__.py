"""Synthetic stand-ins for the paper's evaluation datasets.

Each module exposes ``<name>_tables(spark, scale=..., seed=...) ->
dict[str, DataFrame]``; ``registry.all_datasets`` maps dataset name to
its table builder, and :mod:`repro.datasets.queries` defines the 16 SPJ
evaluation views of Table II.
"""
from repro.datasets.registry import all_datasets, dataset_tables

__all__ = ["all_datasets", "dataset_tables"]
