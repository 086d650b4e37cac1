"""Algorithm 3 — joinUpFDs: per-side upstaged FDs at a join node.

Lemma 2: the upstaged FDs of side ``I`` are the new FDs of
``I ⋈ π_K(J)`` — the semijoin-reduced instance. Implemented with a
``left_semi`` join against the distinct join-key projection of the other
side, so the reduction job reads only the join columns of ``J``
(partition-pruned scan).

Side behaviour per join operator (see DESIGN.md "Interpretation
decisions"):

- ``inner``/``semi``: a side can only *lose* tuples → its FDs are
  preserved (Theorem 1) and new ones are mined iff the reduction dropped
  rows (Alg. 3 line 14).
- ``left``/``right``: the preserved side is untouched; the other side
  both loses tuples and gains NULL padding → inherited FDs are
  *validated* on the side projection of the join and new ones mined.
- ``full``: no side loses tuples; padding can only break FDs →
  validation only.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Iterable

from pyspark.sql import DataFrame

from repro.fd.engine import FDEngine
from repro.fd.lattice import mine_fds
from repro.fd.model import FD


@dataclass
class SideOutcome:
    """Result of processing one side of a join."""

    kept: set[FD]  # inherited FDs still valid on the view's side projection
    upstaged: set[FD]  # newly valid FDs on the side
    dropped: set[FD]  # inherited FDs invalidated by NULL padding (outer only)
    engine: FDEngine | None  # engine over the effective side instance


def process_side(
    side_df: DataFrame,
    side_n: int,
    side_fds: Iterable[FD],
    other_df: DataFrame,
    join_df: DataFrame,
    K: tuple[str, ...],
    scope_attrs: frozenset[str],
    *,
    loses: bool,
    padded: bool,
    backend: str = "spark",
) -> SideOutcome:
    """Compute the side's effective instance and its complete FD set."""
    side_fds = set(side_fds)
    if not loses and not padded:
        return SideOutcome(kept=side_fds, upstaged=set(), dropped=set(), engine=None)

    if padded:
        # Outer join: the honest side instance is the side projection of
        # the join itself (matched rows, duplicated, plus NULL padding).
        side_cols = [c for c in side_df.columns if c in join_df.columns]
        eff = join_df.select(*side_cols)
    else:
        eff = side_df.join(
            other_df.select(*K).distinct(), on=list(K), how="left_semi"
        )
    engine = FDEngine(eff if backend == "spark" else eff.toPandas(), backend=backend)

    kept, dropped = side_fds, set()
    if padded:
        checks = engine.check_fds(sorted(side_fds))
        kept = {d for d, ok in checks.items() if ok}
        dropped = side_fds - kept

    upstaged: set[FD] = set()
    if loses and (padded or engine.n_rows() < side_n):
        mine_scope = scope_attrs & frozenset(side_df.columns)
        upstaged = mine_fds(engine, mine_scope, known=kept)
    return SideOutcome(kept=kept, upstaged=upstaged, dropped=dropped, engine=engine)
