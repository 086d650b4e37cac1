"""Coverage metric tests (paper Section V formula)."""
import pandas as pd
import pytest

from repro.harness.metrics import coverage
from repro.views.spec import BaseRel, Join, Project, Select


def _tables(spark, L, R):
    return {"L": spark.createDataFrame(L), "R": spark.createDataFrame(R)}


class TestCoverage:
    def test_perfect_one_to_one(self, spark):
        L = pd.DataFrame({"k": [1, 2, 3], "a": [0, 0, 0]})
        R = pd.DataFrame({"k": [1, 2, 3], "b": [1, 1, 1]})
        spec = Join(BaseRel("L"), BaseRel("R"), on=("k",))
        assert coverage(_tables(spark, L, R), spec) == pytest.approx(1.0)

    def test_tuple_loss_below_one(self, spark):
        L = pd.DataFrame({"k": [1, 2, 3, 4], "a": [0] * 4})
        R = pd.DataFrame({"k": [1, 2], "b": [1, 1]})
        spec = Join(BaseRel("L"), BaseRel("R"), on=("k",))
        # left: mean(1,1,0,0)=0.5; right: mean(1,1)=1.0 -> 0.75
        assert coverage(_tables(spark, L, R), spec) == pytest.approx(0.75)

    def test_duplication_above_one(self, spark):
        L = pd.DataFrame({"k": [1, 1, 2], "a": [0, 1, 2]})
        R = pd.DataFrame({"k": [1, 2], "b": [5, 6]})
        spec = Join(BaseRel("L"), BaseRel("R"), on=("k",))
        # left groups: k=1 (2 rows -> 2 join rows, ratio 1), k=2 ratio 1
        # right groups: k=1 ratio 2, k=2 ratio 1 -> mean 1.5 -> avg 1.25
        assert coverage(_tables(spark, L, R), spec) == pytest.approx(1.25)

    def test_disjoint_keys_zero(self, spark):
        L = pd.DataFrame({"k": [1], "a": [0]})
        R = pd.DataFrame({"k": [2], "b": [0]})
        spec = Join(BaseRel("L"), BaseRel("R"), on=("k",))
        assert coverage(_tables(spark, L, R), spec) == pytest.approx(0.0)

    def test_join_free_view_none(self, spark):
        L = pd.DataFrame({"k": [1], "a": [0]})
        tables = {"L": spark.createDataFrame(L)}
        assert coverage(tables, Select(BaseRel("L"), "a = 0")) is None

    def test_descends_through_projection(self, spark):
        L = pd.DataFrame({"k": [1, 2], "a": [0, 1]})
        R = pd.DataFrame({"k": [1, 2], "b": [5, 6]})
        spec = Project(Join(BaseRel("L"), BaseRel("R"), on=("k",)), ("a", "b"))
        assert coverage(_tables(spark, L, R), spec) == pytest.approx(1.0)
