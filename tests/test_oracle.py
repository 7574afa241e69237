"""Tests for the provided DuckDB oracle itself (it must catch bugs)."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


class TestOracle:
    def test_passes_on_equal_results(self, spark):
        pdf = pd.DataFrame({"a": [1, 2], "b": [3, 4]})
        df = spark.createDataFrame(pdf)
        assert_equivalent(df, "SELECT a, b FROM t", t=pdf)

    def test_detects_missing_row(self, spark):
        pdf = pd.DataFrame({"a": [1, 2], "b": [3, 4]})
        df = spark.createDataFrame(pdf.head(1))
        with pytest.raises(AssertionError):
            assert_equivalent(df, "SELECT a, b FROM t", t=pdf)

    def test_detects_wrong_value(self, spark):
        pdf = pd.DataFrame({"a": [1], "b": [3]})
        df = spark.createDataFrame(pd.DataFrame({"a": [1], "b": [99]}))
        with pytest.raises(AssertionError):
            assert_equivalent(df, "SELECT a, b FROM t", t=pdf)

    def test_detects_column_mismatch(self, spark):
        pdf = pd.DataFrame({"a": [1]})
        df = spark.createDataFrame(pd.DataFrame({"z": [1]}))
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(df, "SELECT a FROM t", t=pdf)

    def test_row_order_is_ignored(self, spark):
        pdf = pd.DataFrame({"a": [1, 2, 3]})
        df = spark.createDataFrame(pd.DataFrame({"a": [3, 1, 2]}))
        assert_equivalent(df, "SELECT a FROM t", t=pdf)

    def test_spark_frames_accepted_as_inputs(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"a": [1, 2]}))
        assert_equivalent(df, "SELECT a FROM t", t=df)

    def test_recursive_cte_oracle(self, spark):
        # The pattern every linear-program test uses.
        arc = pd.DataFrame({"src": [0, 1], "dst": [1, 2]})
        tc = spark.createDataFrame(
            pd.DataFrame({"c0": [0, 0, 1], "c1": [1, 2, 2]})
        )
        assert_equivalent(
            tc,
            """WITH RECURSIVE tc(x, y) AS (
                   SELECT src, dst FROM arc
                   UNION
                   SELECT tc.x, arc.dst FROM tc JOIN arc ON tc.y = arc.src)
               SELECT x AS c0, y AS c1 FROM tc""",
            arc=arc,
        )
