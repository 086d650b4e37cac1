"""Table II — SPJ view characteristics: Tuple# and FD# per view."""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.datasets import dataset_tables
from repro.datasets.queries import all_queries
from repro.harness.straightforward import straightforward


def table2_rows(spark: SparkSession, *, scale: "float | dict" = 1.0, algo: str = "fun") -> list[dict]:
    rows = []
    by_ds: dict[str, dict] = {}
    for q in all_queries():
        if q.dataset not in by_ds:
            from repro.harness import resolve_scale

            by_ds[q.dataset] = dataset_tables(
                spark, q.dataset, scale=resolve_scale(scale, q.dataset)
            )
        tables = by_ds[q.dataset]
        res = straightforward(tables, q.spec, algo=algo)
        rows.append(
            {
                "db": q.dataset,
                "view": q.name,
                "tuples": res.n_rows,
                "fds": len(res.fds),
            }
        )
    for tables in by_ds.values():
        for df in tables.values():
            df.unpersist()
    return rows


def format_table2(rows: list[dict]) -> str:
    out = ["| DB | SPJ View | Tuple# | FD# |", "|---|---|---|---|"]
    for r in rows:
        out.append(f"| {r['db']} | {r['view']} | {r['tuples']:,} | {r['fds']} |")
    return "\n".join(out)
