"""Distinct-count engine: the single source of FD-validity truth.

``X -> y`` holds on an instance iff ``|distinct(X)| == |distinct(X ∪ {y})|``
— the partition-cardinality test of TANE, expressed over Spark DataFrames
as batched ``count_distinct(struct(...))`` aggregations so that one Spark
job validates a whole lattice level and Catalyst's column pruning reads
only the attributes actually referenced ("mine only necessary data
partitions" per the paper).

``struct`` is used (rather than multi-column ``count(DISTINCT a, b)``)
because a struct is never NULL, so rows with NULL fields are counted and
NULL compares equal to NULL inside the distinct — the null-agnostic FD
semantics of the paper (Definition 1 remark).

A ``pandas`` backend (collect-once + ``drop_duplicates``) exists for
micro-tests of search logic; benchmarks and integration paths use Spark.
"""
from __future__ import annotations

from typing import Iterable

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.fd.model import FD

# How many count_distinct aggregates to put in a single Spark job. Each
# distinct aggregate expands the input once (Expand operator), so this
# bounds the expansion factor per job.
_BATCH = 32


class FDEngine:
    """Memoized distinct counts over one DataFrame (or pandas frame)."""

    def __init__(
        self,
        df: DataFrame | pd.DataFrame,
        backend: str = "spark",
        *,
        n_rows: int | None = None,
    ):
        if isinstance(df, pd.DataFrame):
            backend = "pandas"
        self.backend = backend
        if backend == "pandas":
            self._pdf = df if isinstance(df, pd.DataFrame) else df.toPandas()
            self.df = None
        elif backend == "spark":
            self.df = df
            self._pdf = None
        else:
            raise ValueError(f"unknown backend {backend!r}")
        self._cache: dict[frozenset[str], int] = {}
        self._nrows: int | None = n_rows  # pre-known row count skips a job
        self.jobs = 0  # number of Spark aggregation jobs issued

    # -- row count ---------------------------------------------------------
    def n_rows(self) -> int:
        if self._nrows is None:
            if self.backend == "pandas":
                self._nrows = len(self._pdf)
            else:
                self._nrows = self.df.count()
                self.jobs += 1
        return self._nrows

    # -- distinct counts ---------------------------------------------------
    def prefetch(self, attr_sets: Iterable[frozenset[str]]) -> None:
        """Compute and cache distinct counts for all given attribute sets,
        batching uncached ones into as few jobs as possible."""
        todo = []
        seen = set()
        for s in attr_sets:
            s = frozenset(s)
            if s and s not in self._cache and s not in seen:
                todo.append(s)
                seen.add(s)
        if not todo:
            return
        if self.backend == "pandas":
            for s in todo:
                self._cache[s] = len(
                    self._pdf.drop_duplicates(subset=sorted(s)).index
                )
            return
        for i in range(0, len(todo), _BATCH):
            chunk = todo[i : i + _BATCH]
            aggs = [
                F.count_distinct(F.struct(*sorted(s))).alias(f"c{j}")
                for j, s in enumerate(chunk)
            ]
            row = self.df.agg(*aggs).collect()[0]
            self.jobs += 1
            for j, s in enumerate(chunk):
                self._cache[s] = row[f"c{j}"]

    def distinct_count(self, attrs: Iterable[str]) -> int:
        s = frozenset(attrs)
        if not s:
            # |distinct(∅)| is 1 on a non-empty instance, 0 on an empty one.
            return 1 if self.n_rows() > 0 else 0
        if s not in self._cache:
            self.prefetch([s])
        return self._cache[s]

    # -- FD checks ---------------------------------------------------------
    def holds(self, lhs: Iterable[str], rhs: str) -> bool:
        lhs = frozenset(lhs)
        return self.distinct_count(lhs) == self.distinct_count(lhs | {rhs})

    def check_fds(self, fds: Iterable[FD]) -> dict[FD, bool]:
        """Validate many FDs with batched jobs."""
        fds = list(fds)
        wanted: list[frozenset[str]] = []
        for d in fds:
            wanted.append(d.lhs_set())
            wanted.append(d.attrs())
        self.prefetch(w for w in wanted if w)
        return {d: self.holds(d.lhs_set(), d.rhs) for d in fds}

    # -- violation sampling (HyFD) ----------------------------------------
    def violating_pair(self, lhs: Iterable[str], rhs: str) -> tuple[dict, dict] | None:
        """Return two rows that agree on ``lhs`` but differ on ``rhs``,
        or None if the FD holds. Used by HyFD's validation phase to grow
        the negative cover from real violations."""
        lhs = sorted(frozenset(lhs))
        if self.backend == "pandas":
            pdf = self._pdf
            if lhs:
                for _, grp in pdf.groupby(lhs, dropna=False):
                    dd = grp.drop_duplicates(subset=[rhs])
                    if len(dd) > 1:
                        return dd.iloc[0].to_dict(), dd.iloc[1].to_dict()
                return None
            dd = pdf.drop_duplicates(subset=[rhs])
            if len(dd) > 1:
                return dd.iloc[0].to_dict(), dd.iloc[1].to_dict()
            return None
        if lhs:
            bad = (
                self.df.groupBy(*lhs)
                .agg(F.count_distinct(F.struct(rhs)).alias("_n"))
                .filter(F.col("_n") > 1)
                .limit(1)
                .collect()
            )
            self.jobs += 1
            if not bad:
                return None
            key = bad[0]
            cond = None
            for a in lhs:
                c = F.col(a).eqNullSafe(F.lit(key[a]))
                cond = c if cond is None else (cond & c)
            rows = self.df.filter(cond).dropDuplicates([rhs]).limit(2).collect()
        else:
            rows = self.df.dropDuplicates([rhs]).limit(2).collect()
        self.jobs += 1
        if len(rows) < 2:
            return None
        return rows[0].asDict(), rows[1].asDict()

    def sample_rows(self, n: int, seed: int = 0) -> pd.DataFrame:
        """A deterministic sample of up to ``n`` rows (for HyFD's sampling
        phase)."""
        if self.backend == "pandas":
            if len(self._pdf) <= n:
                return self._pdf.copy()
            return self._pdf.sample(n=n, random_state=seed).reset_index(drop=True)
        frac = min(1.0, n / max(1, self.n_rows()) * 1.2)
        self.jobs += 1
        return self.df.sample(fraction=frac, seed=seed).limit(n).toPandas()
