"""Algorithm 4 — inferFDs: cross-table FDs via Armstrong transitivity
through the join attributes, then minimality refinement on a partial join.

Theorem 2: if ``A → K`` holds on one side and ``K → b`` on the other,
then ``A → b`` holds on the (inner) join. The ``infer`` subroutine
enumerates those; ``refine`` then searches proper lhs subsets on the
*partial* join — Catalyst only scans the columns involved, which is the
paper's "horizontal partition with only the necessary attributes".

For non-inner joins NULL padding can break Theorem 2's premise, so the
raw inferred FDs are additionally validated against the join instance
(a deviation documented in DESIGN.md, required for correctness).
"""
from __future__ import annotations

from itertools import combinations
from typing import Iterable

from repro.fd.engine import FDEngine
from repro.fd.model import FD, by_rhs, determines, has_subset_fd


def infer_join_fds(
    join_engine: FDEngine,
    K: frozenset[str],
    atts_left: frozenset[str],
    atts_right: frozenset[str],
    fds_left: Iterable[FD],
    fds_right: Iterable[FD],
    *,
    scope: frozenset[str],
    validate_raw: bool = False,
) -> set[FD]:
    """Both directions of Algorithm 4 (lines 3-4) plus ``refine``."""
    fds_left, fds_right = set(fds_left), set(fds_right)
    idx_l, idx_r = by_rhs(fds_left), by_rhs(fds_right)
    raw: set[FD] = set()
    raw |= _infer_one_direction(K, atts_left, atts_right, fds_left, idx_l, idx_r, scope)
    raw |= _infer_one_direction(K, atts_right, atts_left, fds_right, idx_r, idx_l, scope)
    known_idx = by_rhs(fds_left | fds_right)
    return _refine(join_engine, raw, known_idx, validate_raw=validate_raw)


def _infer_one_direction(K, atts_src, atts_dst, fds_src, idx_src, idx_dst, scope):
    """lhs candidates from the source side that determine K; rhs from the
    destination side determined by K (subroutine ``infer``)."""
    rhs_pool = sorted(
        b
        for b in (atts_dst - K - atts_src) & scope
        if has_subset_fd(idx_dst, K, b)
    )
    if not rhs_pool:
        return set()
    lhs_cands = {frozenset(K)}
    for d in fds_src:
        a = d.lhs_set()
        if determines(idx_src, a, K):
            lhs_cands.add(a)
    return {
        FD(a, b) for a in lhs_cands for b in rhs_pool if b not in a
    }


def _refine(engine, raw, known_idx, *, validate_raw):
    """Subroutine ``refine``: per inferred FD, find the minimal valid lhs
    subsets on the partial join. Levels are processed jointly across all
    rhs attributes so each subset size costs O(1) Spark jobs."""
    out: set[FD] = set()
    by_target: dict[str, set[frozenset[str]]] = {}
    for d in raw:
        by_target.setdefault(d.rhs, set()).add(d.lhs_set())
    if not by_target:
        return out
    minimal: dict[str, list[frozenset[str]]] = {rhs: [] for rhs in by_target}
    max_size = max(len(a) for lhss in by_target.values() for a in lhss)
    for size in range(0, max_size + 1):
        level: list[FD] = []
        full: set[FD] = set()
        for rhs, lhss in sorted(by_target.items()):
            cands = set()
            for a in lhss:
                if len(a) > size:
                    cands.update(frozenset(c) for c in combinations(sorted(a), size))
                elif len(a) == size:
                    cands.add(a)
            for c in sorted(cands, key=sorted):
                if any(m <= c for m in minimal[rhs]):
                    continue  # already subsumed by a smaller valid lhs
                if has_subset_fd(known_idx, c, rhs):
                    # subsumed by an already-known (single-side) FD: the
                    # inferred FD is non-minimal, nothing new to emit.
                    minimal[rhs].append(c)
                    continue
                d = FD(c, rhs)
                level.append(d)
                if c in lhss:
                    full.add(d)
        if not level:
            continue
        # Raw FDs are valid by Theorem 2 on inner joins (checked only
        # when validate_raw, i.e. outer joins); proper subsets must
        # always be checked against the data.
        results = engine.check_fds([d for d in level if d not in full])
        if validate_raw:
            results.update(engine.check_fds(sorted(full)))
        else:
            results.update({d: True for d in full})
        for d in level:
            if results.get(d, False) and not any(
                m <= d.lhs_set() for m in minimal[d.rhs]
            ):
                minimal[d.rhs].append(d.lhs_set())
                out.add(d)
    return out
