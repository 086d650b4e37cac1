"""Distinct-count engine tests: Spark vs pandas backends, null semantics,
batching, memoization."""
import numpy as np
import pandas as pd
import pytest

from repro.fd.engine import FDEngine
from repro.fd.model import FD
from tests.helpers import random_table


@pytest.fixture(scope="module")
def pdf():
    return random_table(3, n=40, with_nulls=True)


@pytest.fixture(scope="module")
def engines(spark, pdf):
    return FDEngine(spark.createDataFrame(pdf)), FDEngine(pdf)


class TestBackendAgreement:
    @pytest.mark.parametrize(
        "cols", [["a"], ["b"], ["a", "b"], ["a", "c", "d"], ["a", "b", "c", "d", "e"]]
    )
    def test_distinct_counts_match(self, engines, cols):
        se, pe = engines
        assert se.distinct_count(cols) == pe.distinct_count(cols)

    def test_n_rows_match(self, engines):
        se, pe = engines
        assert se.n_rows() == pe.n_rows() == 40

    @pytest.mark.parametrize("seed", range(5))
    def test_holds_matches(self, spark, seed):
        pdf = random_table(seed + 100, n=25, with_nulls=(seed % 2 == 0))
        se, pe = FDEngine(spark.createDataFrame(pdf)), FDEngine(pdf)
        for lhs, rhs in [(["a"], "b"), (["a", "c"], "e"), ([], "a"), (["e"], "a")]:
            assert se.holds(lhs, rhs) == pe.holds(lhs, rhs), (seed, lhs, rhs)


class TestNullSemantics:
    def test_null_equals_null(self, spark):
        pdf = pd.DataFrame({"a": [1.0, 1.0, np.nan, np.nan], "b": [5, 5, 7, 7]})
        se = FDEngine(spark.createDataFrame(pdf))
        # two distinct a-values: 1.0 and NULL (NULL == NULL inside distinct)
        assert se.distinct_count(["a"]) == 2
        assert se.holds(["a"], "b")

    def test_null_breaks_fd_when_rhs_differs(self, spark):
        pdf = pd.DataFrame({"a": [np.nan, np.nan], "b": [1, 2]})
        se = FDEngine(spark.createDataFrame(pdf))
        assert not se.holds(["a"], "b")


class TestEmptyAndEdge:
    def test_empty_lhs_constant(self):
        e = FDEngine(pd.DataFrame({"a": [1, 1, 1], "b": [1, 2, 3]}))
        assert e.holds([], "a")
        assert not e.holds([], "b")

    def test_empty_instance_all_fds_hold(self, spark):
        e = FDEngine(spark.createDataFrame([], "a int, b int"))
        assert e.n_rows() == 0
        assert e.holds(["a"], "b") and e.holds([], "a")

    def test_single_row(self):
        e = FDEngine(pd.DataFrame({"a": [1], "b": [2]}))
        assert e.holds([], "a") and e.holds(["a"], "b")


class TestBatchingAndCache:
    def test_prefetch_batches_into_one_job(self, spark, pdf):
        e = FDEngine(spark.createDataFrame(pdf), n_rows=len(pdf))
        sets = [frozenset(c) for c in (["a"], ["b"], ["a", "b"], ["c", "d"], ["e"])]
        e.prefetch(sets)
        assert e.jobs == 1
        before = e.jobs
        for s in sets:
            e.distinct_count(s)
        assert e.jobs == before  # all cached

    def test_n_rows_hint_skips_count(self, spark, pdf):
        e = FDEngine(spark.createDataFrame(pdf), n_rows=40)
        assert e.n_rows() == 40
        assert e.jobs == 0

    def test_check_fds_batched(self, spark):
        pdf = random_table(3, n=40, with_nulls=False)  # keep (a,c)->e intact
        e = FDEngine(spark.createDataFrame(pdf))
        fds = [FD(["a"], "e"), FD(["a", "c"], "e"), FD([], "b")]
        res = e.check_fds(fds)
        assert res[FD(["a", "c"], "e")] is True  # e = a*10+c by construction
        assert set(res) == set(fds)


class TestViolatingPair:
    @pytest.mark.parametrize("backend", ["spark", "pandas"])
    def test_pair_found_for_violation(self, spark, backend):
        pdf = pd.DataFrame({"a": [1, 1, 2], "b": [5, 6, 7]})
        e = FDEngine(spark.createDataFrame(pdf) if backend == "spark" else pdf)
        pair = e.violating_pair(["a"], "b")
        assert pair is not None
        r1, r2 = pair
        assert r1["a"] == r2["a"] and r1["b"] != r2["b"]

    @pytest.mark.parametrize("backend", ["spark", "pandas"])
    def test_none_when_fd_holds(self, spark, backend):
        pdf = pd.DataFrame({"a": [1, 1, 2], "b": [5, 5, 7]})
        e = FDEngine(spark.createDataFrame(pdf) if backend == "spark" else pdf)
        assert e.violating_pair(["a"], "b") is None

    def test_empty_lhs_pair(self):
        e = FDEngine(pd.DataFrame({"a": [1, 2]}))
        pair = e.violating_pair([], "a")
        assert pair is not None and pair[0]["a"] != pair[1]["a"]
