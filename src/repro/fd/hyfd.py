"""HyFD baseline (Papenbrock & Naumann, SIGMOD'16) — hybrid discovery.

Phase 1 (tuple-pair sampling): a bounded sample of rows is compared
pair-wise under several sort orders (neighbouring rows are likely to
agree somewhere — HyFD's focused sampling); each pair's agree set
refutes candidate FDs, specializing a negative-cover-complement lattice
of candidate minimal FDs.

Phase 2 (validation): surviving candidates are validated with batched
distinct-count jobs on Spark. Every violated candidate yields a real
violating pair whose agree set drives further specialization — the
hybrid back-and-forth of the original algorithm. Terminates when all
candidates validate; the result is exactly the minimal FD set.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame

from repro.fd.engine import FDEngine
from repro.fd.model import FD, minimize


def _agree_set(row1: dict, row2: dict, attrs: list[str]) -> frozenset[str]:
    out = []
    for a in attrs:
        v1, v2 = row1[a], row2[a]
        if v1 == v2 or (pd.isna(v1) and pd.isna(v2)):
            out.append(a)
    return frozenset(out)


class _Candidates:
    """Per-rhs sets of candidate minimal lhs's, specialized by non-FDs."""

    def __init__(self, attrs: list[str]):
        self.attrs = attrs
        self.lhss: dict[str, set[frozenset[str]]] = {
            y: {frozenset()} for y in attrs
        }

    def specialize(self, agree: frozenset[str]) -> None:
        """The pair refutes X -> y for every X ⊆ agree, y ∉ agree."""
        for y in self.attrs:
            if y in agree:
                continue
            hit = {x for x in self.lhss[y] if x <= agree}
            if not hit:
                continue
            pool = self.lhss[y] - hit
            for x in hit:
                for a in self.attrs:
                    if a == y or a in x or a in agree:
                        continue
                    nx = x | {a}
                    if not any(p <= nx for p in pool):
                        pool = {p for p in pool if not nx <= p} | {nx}
            self.lhss[y] = pool

    def all_fds(self) -> list[FD]:
        return [FD(x, y) for y, xs in self.lhss.items() for x in xs]


def _sample_pairs(pdf: pd.DataFrame, attrs: list[str], window: int = 4):
    """Neighbouring row pairs under one sort order per attribute."""
    pdf = pdf.reset_index(drop=True)
    rows = pdf.to_dict("records")
    n = len(rows)
    seen: set[tuple[int, int]] = set()
    for a in attrs:
        order = pdf.sort_values(a, kind="stable", na_position="last").index.to_list()
        for i in range(n - 1):
            for w in range(1, min(window, n - 1 - i) + 1):
                p = (min(order[i], order[i + w]), max(order[i], order[i + w]))
                if p[0] != p[1] and p not in seen:
                    seen.add(p)
                    yield rows[p[0]], rows[p[1]]


def hyfd(
    df: DataFrame | pd.DataFrame,
    attrs=None,
    *,
    sample_size: int = 500,
    backend: str = "spark",
    max_rounds: int = 10_000,
) -> set[FD]:
    """All minimal FDs of the instance restricted to ``attrs``."""
    if isinstance(df, pd.DataFrame):
        engine = FDEngine(df)
        attrs = sorted(attrs) if attrs is not None else sorted(df.columns)
    else:
        attrs = sorted(attrs) if attrs is not None else sorted(df.columns)
        engine = FDEngine(
            df.select(*attrs).toPandas() if backend == "pandas" else df.select(*attrs)
        )
    cands = _Candidates(attrs)

    # Phase 1: sampling-driven specialization.
    sample = engine.sample_rows(sample_size)
    for r1, r2 in _sample_pairs(sample, attrs):
        ag = _agree_set(r1, r2, attrs)
        if len(ag) < len(attrs):
            cands.specialize(ag)

    # Phase 2: validation + violation-driven refinement.
    for _ in range(max_rounds):
        pending = cands.all_fds()
        results = engine.check_fds(pending)
        violated = [d for d, ok in results.items() if not ok]
        if not violated:
            return minimize(set(pending))
        progressed = False
        for d in violated:
            pair = engine.violating_pair(d.lhs_set(), d.rhs)
            if pair is None:
                continue  # validated meanwhile (specialized away)
            ag = _agree_set(pair[0], pair[1], attrs)
            if len(ag) < len(attrs):
                cands.specialize(ag)
                progressed = True
        if not progressed:
            # All violated candidates were already specialized away by
            # pairs fetched for earlier FDs this round.
            survivors = {d for d, ok in results.items() if ok}
            fresh = set(cands.all_fds())
            if fresh <= survivors:
                return minimize(fresh)
    raise RuntimeError("HyFD failed to converge")
