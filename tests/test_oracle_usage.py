"""The oracle itself must catch wrong results, not just bless right ones."""
import pandas as pd
import pytest

from repro.graph.duck_sql import h_support_sql
from repro.oracle import assert_equivalent


class TestOracle:
    def test_passes_on_equal(self, sparkf):
        pdf = pd.DataFrame({"k": [1, 2], "n": [10, 20]})
        df = sparkf.createDataFrame(pdf)
        assert_equivalent(df, "SELECT k, n FROM t", t=pdf)

    def test_fails_on_value_mismatch(self, sparkf):
        pdf = pd.DataFrame({"k": [1, 2], "n": [10, 20]})
        df = sparkf.createDataFrame(pd.DataFrame({"k": [1, 2], "n": [10, 99]}))
        with pytest.raises(AssertionError):
            assert_equivalent(df, "SELECT k, n FROM t", t=pdf)

    def test_fails_on_missing_row(self, sparkf):
        pdf = pd.DataFrame({"k": [1, 2], "n": [10, 20]})
        df = sparkf.createDataFrame(pd.DataFrame({"k": [1], "n": [10]}))
        with pytest.raises(AssertionError):
            assert_equivalent(df, "SELECT k, n FROM t", t=pdf)

    def test_fails_on_column_mismatch(self, sparkf):
        pdf = pd.DataFrame({"k": [1]})
        df = sparkf.createDataFrame(pd.DataFrame({"wrong": [1]}))
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(df, "SELECT k FROM t", t=pdf)

    def test_row_order_is_ignored(self, sparkf):
        pdf = pd.DataFrame({"k": [2, 1], "n": [20, 10]})
        df = sparkf.createDataFrame(pd.DataFrame({"k": [1, 2], "n": [10, 20]}))
        assert_equivalent(df, "SELECT k, n FROM t", t=pdf)

    def test_duck_sql_catches_wrong_support(self, sparkf):
        """A deliberately corrupted support column must be rejected."""
        edges = pd.DataFrame({"src": [0, 1, 0], "dst": [1, 2, 2]})
        wrong = sparkf.createDataFrame(
            pd.DataFrame(
                {"src": [0, 0, 1], "dst": [1, 2, 2], "support": [9, 9, 9]}
            )
        )
        with pytest.raises(AssertionError):
            assert_equivalent(wrong, h_support_sql(1), edges=edges)
