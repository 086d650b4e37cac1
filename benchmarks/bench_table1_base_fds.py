"""Benchmark — Table I workload: FD discovery over the base tables of
each dataset (InFine step 1's cost center)."""
import pytest

from repro.datasets import all_datasets
from repro.fd.engine import FDEngine
from repro.fd.fun import fun_on_engine

from repro.harness import BENCH_SCALE as SCALE  # noqa: N811


@pytest.mark.parametrize("ds", sorted(all_datasets))
def test_base_table_mining(benchmark, spark, ds):
    tables = {k: v.cache() for k, v in all_datasets[ds](spark, scale=SCALE[ds]).items()}
    counts = {k: v.count() for k, v in tables.items()}

    def run():
        total = 0
        for name, df in tables.items():
            fds = fun_on_engine(FDEngine(df, n_rows=counts[name]), df.columns)
            total += len(fds)
        return total

    total = benchmark.pedantic(run, rounds=1, iterations=1)
    assert total > 0
    for df in tables.values():
        df.unpersist()
