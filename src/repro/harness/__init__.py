"""Experiment harnesses reproducing the paper's evaluation tables."""
from __future__ import annotations

# Per-dataset scales used by the benchmark suite (paper-like row counts).
BENCH_SCALE = {"mimic3": 8.0, "pte": 5.0, "ptc": 5.0, "tpch": 10.0}


def resolve_scale(scale, dataset: str) -> float:
    """A harness ``scale`` may be one float for all datasets or a
    per-dataset mapping."""
    if isinstance(scale, dict):
        return scale.get(dataset, 1.0)
    return float(scale)
