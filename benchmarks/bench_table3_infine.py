"""Benchmark — Table III workload: the full InFine pipeline per view."""
import pytest

from repro.core.infine import run_infine
from repro.datasets import dataset_tables
from repro.datasets.queries import all_queries

from repro.harness import BENCH_SCALE as SCALE  # noqa: N811
_CACHE: dict[str, dict] = {}


def _tables(spark, ds):
    if ds not in _CACHE:
        _CACHE[ds] = dataset_tables(spark, ds, scale=SCALE[ds])
    return _CACHE[ds]


@pytest.mark.parametrize(
    "q", [pytest.param(q, id=f"{q.dataset}:{q.name}") for q in all_queries()]
)
def test_infine(benchmark, spark, q):
    tables = _tables(spark, q.dataset)
    res = benchmark.pedantic(
        lambda: run_infine(tables, q.spec), rounds=1, iterations=1
    )
    assert len(res.triples) >= 1
    assert abs(sum(res.stage_fractions().values()) - 1.0) < 1e-9
