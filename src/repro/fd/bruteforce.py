"""Brute-force minimal-FD miner over a pandas frame — the test oracle.

Exhaustively checks every (lhs, rhs) pair over the powerset of attributes.
Exponential; only for instances with ≤ ~10 attributes in tests.
"""
from __future__ import annotations

from itertools import combinations

import pandas as pd

from repro.fd.model import FD, by_rhs, has_subset_fd


def _dc(pdf: pd.DataFrame, cols: frozenset[str]) -> int:
    if not cols:
        return 1 if len(pdf) else 0
    return len(pdf.drop_duplicates(subset=sorted(cols)).index)


def brute_force_fds(pdf: pd.DataFrame, attrs=None) -> set[FD]:
    """All minimal FDs of ``pdf`` restricted to ``attrs`` (default: all
    columns). NULL/NaN compares equal to itself, matching the engine."""
    attrs = sorted(attrs) if attrs is not None else sorted(pdf.columns)
    found: set[FD] = set()
    idx: dict[str, list[frozenset[str]]] = {}
    n = len(pdf)
    for k in range(0, len(attrs)):
        for lhs_t in combinations(attrs, k):
            lhs = frozenset(lhs_t)
            dcl = _dc(pdf, lhs)
            for rhs in attrs:
                if rhs in lhs or has_subset_fd(idx, lhs, rhs):
                    continue
                if (dcl if n else 0) == _dc(pdf, lhs | {rhs}):
                    d = FD(lhs, rhs)
                    found.add(d)
                    idx.setdefault(rhs, []).append(lhs)
    # idx grows within a level in combination order; re-minimize to be safe.
    from repro.fd.model import minimize

    return minimize(found)
