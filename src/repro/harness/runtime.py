"""Fig. 3 / Fig. 4 as a table — runtime and driver-memory comparison of
InFine against the four straightforward baselines per SPJ view.

Runtime: InFine pipeline time (excluding base-table mining, as the paper
does — that cost is identical on both sides because provenance requires
base FDs either way) vs. view materialization + mining time per baseline.

Memory: ``tracemalloc`` peak of driver-side Python allocations during
the run, plus the number of view rows each method materializes — the
portable proxies for the paper's process-peak measurement (DESIGN.md).
"""
from __future__ import annotations

import time
import tracemalloc
from typing import Callable

from pyspark.sql import SparkSession

from repro.core.infine import run_infine
from repro.datasets import dataset_tables
from repro.datasets.queries import QueryDef, all_queries
from repro.harness.straightforward import straightforward

BASELINES = ("hyfd", "fun", "tane", "fastfds")

# Views whose quadratic agree-set enumeration exceeds the FastFDs pair
# budget at benchmark scale get a lower-bound marker instead of a time.
FASTFDS_MAX_PAIRS = 20_000_000


def _measured(fn: Callable) -> tuple[float, float, object]:
    tracemalloc.start()
    t0 = time.perf_counter()
    out = fn()
    dt = time.perf_counter() - t0
    _, peak = tracemalloc.get_traced_memory()
    tracemalloc.stop()
    return dt, peak / 1e6, out


def runtime_rows(
    spark: SparkSession,
    *,
    scale: "float | dict" = 1.0,
    queries: list[QueryDef] | None = None,
    baselines: tuple[str, ...] = BASELINES,
) -> list[dict]:
    rows = []
    by_ds: dict[str, dict] = {}
    for q in queries if queries is not None else all_queries():
        if q.dataset not in by_ds:
            from repro.harness import resolve_scale

            by_ds[q.dataset] = dataset_tables(
                spark, q.dataset, scale=resolve_scale(scale, q.dataset)
            )
        tables = by_ds[q.dataset]
        row: dict = {"db": q.dataset, "view": q.name}
        dt, mem, res = _measured(lambda: run_infine(tables, q.spec))
        infine_time = dt - res.timings["base"]  # base mining excluded (paper setup)
        row["infine_s"] = infine_time
        row["infine_mem_mb"] = mem
        row["infine_fds"] = len(res.triples)
        for algo in baselines:
            try:
                dt, mem, sres = _measured(
                    lambda a=algo: straightforward(
                        tables, q.spec, algo=a, max_pairs=FASTFDS_MAX_PAIRS
                    )
                )
                row[f"{algo}_s"] = dt
                row[f"{algo}_mem_mb"] = mem
                row["view_rows"] = sres.n_rows
                if sres.fds != res.fds:
                    row[f"{algo}_mismatch"] = True
            except Exception as exc:  # pair budget exceeded etc.
                row[f"{algo}_s"] = None
                row[f"{algo}_note"] = type(exc).__name__
        rows.append(row)
    for tables in by_ds.values():
        for df in tables.values():
            df.unpersist()
    return rows


def format_runtime(rows: list[dict], baselines: tuple[str, ...] = BASELINES) -> str:
    hdr = "| DB | View | InFine (s) | " + " | ".join(
        f"{b} (s)" for b in baselines
    ) + " | InFine mem (MB) | " + " | ".join(f"{b} mem (MB)" for b in baselines) + " |"
    out = [hdr, "|" + "---|" * (hdr.count("|") - 1)]
    for r in rows:
        cells = [r["db"], r["view"], f"{r['infine_s']:.2f}"]
        for b in baselines:
            v = r.get(f"{b}_s")
            cells.append(f"{v:.2f}" if v is not None else f">budget ({r.get(f'{b}_note','')})")
        cells.append(f"{r['infine_mem_mb']:.1f}")
        for b in baselines:
            v = r.get(f"{b}_mem_mb")
            cells.append(f"{v:.1f}" if v is not None else "-")
        out.append("| " + " | ".join(cells) + " |")
    return "\n".join(out)
