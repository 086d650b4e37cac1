"""Benchmark — Table II workload: materialize each SPJ view and mine its
FDs with the straightforward approach (the cost InFine avoids)."""
import pytest

from repro.datasets import dataset_tables
from repro.datasets.queries import all_queries
from repro.harness.straightforward import straightforward

from repro.harness import BENCH_SCALE as SCALE  # noqa: N811
_CACHE: dict[str, dict] = {}


def _tables(spark, ds):
    if ds not in _CACHE:
        _CACHE[ds] = dataset_tables(spark, ds, scale=SCALE[ds])
    return _CACHE[ds]


@pytest.mark.parametrize(
    "q", [pytest.param(q, id=f"{q.dataset}:{q.name}") for q in all_queries()]
)
def test_view_mining(benchmark, spark, q):
    tables = _tables(spark, q.dataset)
    res = benchmark.pedantic(
        lambda: straightforward(tables, q.spec, algo="fun"), rounds=1, iterations=1
    )
    assert res.n_rows >= 0 and len(res.fds) >= 1
