"""Baseline FD-discovery algorithms (TANE, FUN, FastFDs, HyFD) must all
agree with the brute-force reference on randomized and crafted data."""
import numpy as np
import pandas as pd
import pytest

from repro.fd.bruteforce import brute_force_fds
from repro.fd.engine import FDEngine
from repro.fd.fastfds import PairBudgetExceeded, agree_sets, encode, fastfds
from repro.fd.fun import fun, fun_on_engine
from repro.fd.hyfd import hyfd
from repro.fd.model import FD
from repro.fd.tane import tane, tane_on_engine
from tests.helpers import random_table

SEEDS = range(8)


class TestTane:
    @pytest.mark.parametrize("seed", SEEDS)
    def test_matches_bruteforce(self, seed):
        pdf = random_table(seed, n=24, with_nulls=(seed % 2 == 0))
        assert tane_on_engine(FDEngine(pdf), pdf.columns) == brute_force_fds(pdf)

    def test_spark_entrypoint(self, spark):
        pdf = random_table(0, n=15)
        assert tane(spark.createDataFrame(pdf)) == brute_force_fds(pdf)


class TestFun:
    @pytest.mark.parametrize("seed", SEEDS)
    def test_matches_bruteforce(self, seed):
        pdf = random_table(seed + 30, n=24, with_nulls=(seed % 2 == 1))
        assert fun_on_engine(FDEngine(pdf), pdf.columns) == brute_force_fds(pdf)

    def test_free_set_pruning_uses_fewer_checks(self):
        # non-free sets abound when columns are correlated
        pdf = random_table(5, n=40)
        e_fun, e_tane = FDEngine(pdf), FDEngine(pdf)
        fun_fds = fun_on_engine(e_fun, pdf.columns)
        tane_fds = tane_on_engine(e_tane, pdf.columns)
        assert fun_fds == tane_fds
        assert len(e_fun._cache) <= len(e_tane._cache)

    def test_spark_entrypoint(self, spark):
        pdf = random_table(1, n=15)
        assert fun(spark.createDataFrame(pdf)) == brute_force_fds(pdf)


class TestFastFDs:
    @pytest.mark.parametrize("seed", SEEDS)
    def test_matches_bruteforce(self, seed):
        pdf = random_table(seed + 60, n=24, with_nulls=(seed % 2 == 0))
        assert fastfds(pdf) == brute_force_fds(pdf)

    def test_encode_nulls_one_class(self):
        pdf = pd.DataFrame({"a": [1.0, np.nan, np.nan]})
        enc = encode(pdf, ["a"])
        assert enc[1, 0] == enc[2, 0] != enc[0, 0]

    def test_agree_sets_simple(self):
        enc = np.array([[0, 0], [0, 1], [1, 1]])
        ags = agree_sets(enc)
        assert frozenset([0]) in ags and frozenset([1]) in ags
        assert frozenset([0, 1]) not in ags

    def test_duplicate_rows_collapsed(self):
        enc = np.array([[0, 0], [0, 0], [1, 1]])
        # the only surviving pair differs everywhere -> empty agree set
        assert agree_sets(enc) == {frozenset()}

    def test_all_different_pair_kept(self):
        # regression: a table whose only FD evidence is a pair differing
        # on every attribute must not be reported as constant
        pdf = pd.DataFrame({"d": [1, 2, 3], "act": ["n", "n", "p"]})
        fds = fastfds(pdf)
        assert FD([], "act") not in fds
        assert FD(["d"], "act") in fds

    def test_pair_budget_raises(self):
        pdf = pd.DataFrame({"a": [0] * 100, "b": range(100)})
        with pytest.raises(PairBudgetExceeded):
            fastfds(pdf, max_pairs=10)

    def test_constant_and_key(self):
        pdf = pd.DataFrame({"k": [1, 2, 3], "c": [9, 9, 9], "x": [4, 4, 5]})
        fds = fastfds(pdf)
        assert FD([], "c") in fds and FD(["k"], "x") in fds

    def test_spark_entrypoint(self, spark):
        pdf = random_table(2, n=15)
        assert fastfds(spark.createDataFrame(pdf)) == brute_force_fds(pdf)


class TestHyFD:
    @pytest.mark.parametrize("seed", SEEDS)
    def test_matches_bruteforce(self, seed):
        pdf = random_table(seed + 90, n=24, with_nulls=(seed % 3 == 0))
        assert hyfd(pdf) == brute_force_fds(pdf)

    def test_tiny_sample_still_exact(self):
        # force the validation/refinement loop to do all the work
        pdf = random_table(7, n=60)
        assert hyfd(pdf, sample_size=5) == brute_force_fds(pdf)

    def test_spark_backend(self, spark):
        pdf = random_table(3, n=20)
        assert hyfd(spark.createDataFrame(pdf)) == brute_force_fds(pdf)


class TestCrossAlgorithm:
    @pytest.mark.parametrize("seed", range(5))
    def test_all_four_agree(self, seed):
        pdf = random_table(seed + 200, n=30, cards=(2, 2, 3, 5))
        results = {
            "tane": tane_on_engine(FDEngine(pdf), pdf.columns),
            "fun": fun_on_engine(FDEngine(pdf), pdf.columns),
            "fastfds": fastfds(pdf),
            "hyfd": hyfd(pdf),
        }
        first = results["tane"]
        assert all(r == first for r in results.values())
