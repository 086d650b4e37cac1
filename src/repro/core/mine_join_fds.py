"""Algorithm 5 — mineFDs: selective mining of the remaining join FDs.

Theorem 4 says a join FD ``C -> b`` (with ``b`` on side J) can only be
valid if ``K ∪ (C ∩ atts(J)) -> b`` already holds on side J's reduced
instance; Lemma 3 is the special case where ``C`` lies entirely on the
other side. Both become one sound ``plausible`` pruning rule plugged
into the generic lattice miner, which then validates the surviving
candidates with distinct-count checks over the (column-pruned, partial)
join DataFrame — never the fully materialized wide view.

If no attribute passes the plausible-rhs test with the *maximal*
possible lhs, the search is skipped entirely — the paper's
"mineFDs executed but returns no FD" cases cost nothing here.
"""
from __future__ import annotations

from typing import Iterable

from repro.fd.engine import FDEngine
from repro.fd.lattice import mine_fds
from repro.fd.model import FD, by_rhs, has_subset_fd


def mine_join_fds(
    join_engine: FDEngine,
    scope_attrs: frozenset[str],
    K: frozenset[str],
    atts_left: frozenset[str],
    atts_right: frozenset[str],
    fds_left: Iterable[FD],
    fds_right: Iterable[FD],
    known: Iterable[FD],
) -> set[FD]:
    """All minimal view FDs not already in ``known`` (which must contain
    both sides' complete single-side FD sets and the inferred FDs)."""
    idx_l, idx_r = by_rhs(fds_left), by_rhs(fds_right)
    excl_l = (atts_left - K) & scope_attrs
    excl_r = (atts_right - K) & scope_attrs
    side_l = atts_left & scope_attrs
    side_r = atts_right & scope_attrs

    def rhs_feasible(y: str) -> bool:
        r"""Theorem 4 with the maximal admissible lhs: if even
        ``K ∪ (atts(side)\{y}) -> y`` is not backed by a side FD, ``y``
        can never be the rhs of a join FD."""
        if y in K:
            return True
        if y in excl_r:
            return has_subset_fd(idx_r, (K | excl_r) - {y}, y)
        return has_subset_fd(idx_l, (K | excl_l) - {y}, y)

    rhs_pool = frozenset(y for y in scope_attrs if rhs_feasible(y))
    if not rhs_pool:
        return set()

    def plausible(lhs: frozenset[str], y: str) -> bool:
        s = lhs | {y}
        if s <= side_l or s <= side_r:
            return False  # single-side FDs are complete in `known`
        if y in excl_r:
            return has_subset_fd(idx_r, K | (lhs & side_r), y)
        if y in excl_l:
            return has_subset_fd(idx_l, K | (lhs & side_l), y)
        return True  # y ∈ K with a mixed lhs: no Theorem-4 pruning applies

    return mine_fds(
        join_engine,
        scope_attrs,
        known=known,
        rhs_pool=rhs_pool,
        plausible=plausible,
    )
