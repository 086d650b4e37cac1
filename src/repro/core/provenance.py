"""FD provenance triples (Definition 8).

A triple ``(fd, type, subquery)`` records the kind of the FD and the
*first* sub-query of the view specification in which it holds. Types and
their priority (lower = earlier in the view computation; used to keep
the first-holding triple when the same FD is derivable several ways):
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Iterable

from repro.fd.model import FD, minimize

BASE = "base"
UPSTAGED_SELECTION = "upstaged selection"
UPSTAGED_LEFT = "upstaged left"
UPSTAGED_RIGHT = "upstaged right"
INFERRED = "inferred"
JOIN_FD = "joinFD"

TYPE_PRIORITY = {
    BASE: 0,
    UPSTAGED_SELECTION: 1,
    UPSTAGED_LEFT: 2,
    UPSTAGED_RIGHT: 2,
    INFERRED: 3,
    JOIN_FD: 4,
}


@dataclass(frozen=True)
class Triple:
    """Provenance triple ``(d, t, s)`` for one FD."""

    fd: FD
    type: str
    subquery: str

    def __str__(self) -> str:
        return f"({self.fd}, {self.type!r}, {self.subquery})"


def dedupe_triples(triples: Iterable[Triple]) -> list[Triple]:
    """One triple per FD, keeping the earliest provenance type."""
    best: dict[FD, Triple] = {}
    for t in triples:
        cur = best.get(t.fd)
        if cur is None or TYPE_PRIORITY[t.type] < TYPE_PRIORITY[cur.type]:
            best[t.fd] = t
    return sorted(best.values(), key=lambda t: (t.fd.rhs, t.fd.lhs))


def minimize_triples(triples: Iterable[Triple]) -> list[Triple]:
    """Drop triples whose FD is non-minimal within the collection (an FD
    upstaged later can subsume a base FD), then dedupe by priority."""
    triples = dedupe_triples(triples)
    keep = minimize(t.fd for t in triples)
    return [t for t in triples if t.fd in keep]


def restrict_triples(triples: Iterable[Triple], attrs) -> list[Triple]:
    """Keep only triples over the given attribute set (π handling)."""
    scope = frozenset(attrs)
    return [t for t in triples if t.fd.attrs() <= scope]


def count_by_type(triples: Iterable[Triple]) -> dict[str, int]:
    out = {k: 0 for k in TYPE_PRIORITY}
    for t in triples:
        out[t.type] += 1
    return out
