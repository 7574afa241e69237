"""FAST-DEDUP tests: compact-key packing and fallbacks."""
import pandas as pd
import pytest

from repro.core.dedup import can_pack, compact_key_bits, dedup, with_compact_key


class TestCompactKeyBits:
    def test_two_int32_columns_fit(self):
        # Figure 5's case: two int attributes pack into 8 bytes.
        assert compact_key_bits(2, (1 << 30)) is not None

    def test_bits_grow_with_domain(self):
        assert compact_key_bits(2, 100) == 7
        assert compact_key_bits(2, 1_000_000) == 20

    def test_too_wide_returns_none(self):
        assert compact_key_bits(3, (1 << 40)) is None

    def test_zero_columns(self):
        assert compact_key_bits(0, 100) is None

    def test_negative_domain(self):
        assert compact_key_bits(2, -1) is None

    def test_many_small_columns(self):
        assert compact_key_bits(7, 255) == 8  # 7*8 = 56 bits, fits
        assert compact_key_bits(8, 1 << 10) is None  # 8*11 = 88 > 63


class TestCanPack:
    def test_all_long_ok(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"a": [1], "b": [2]}))
        assert can_pack(df, 100)

    def test_double_column_rejected(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"a": [1], "b": [2.5]}))
        assert not can_pack(df, 100)

    def test_huge_domain_rejected(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"a": [1], "b": [2]}))
        assert not can_pack(df, 1 << 62)


class TestDedup:
    def make(self, spark):
        return spark.createDataFrame(
            pd.DataFrame({"c0": [1, 1, 2, 2, 3], "c1": [5, 5, 6, 6, 7]})
        )

    def test_fast_path_removes_duplicates(self, spark):
        out = dedup(self.make(spark), fast=True, max_value=10)
        assert sorted(map(tuple, out.collect())) == [(1, 5), (2, 6), (3, 7)]

    def test_fast_path_keeps_columns(self, spark):
        out = dedup(self.make(spark), fast=True, max_value=10)
        assert out.columns == ["c0", "c1"]

    def test_generic_path(self, spark):
        out = dedup(self.make(spark), fast=False)
        assert out.count() == 3

    def test_fast_without_bound_falls_back(self, spark):
        out = dedup(self.make(spark), fast=True, max_value=None)
        assert out.count() == 3

    def test_fast_with_oversized_domain_falls_back(self, spark):
        out = dedup(self.make(spark), fast=True, max_value=1 << 62)
        assert out.count() == 3

    def test_no_collisions_on_adjacent_values(self, spark):
        # (1, 0) vs (0, 1) and boundary values must not collide.
        pdf = pd.DataFrame({"c0": [1, 0, 255, 0], "c1": [0, 1, 0, 255]})
        out = dedup(spark.createDataFrame(pdf), fast=True, max_value=255)
        assert out.count() == 4

    def test_key_column_values_distinct(self, spark):
        pdf = pd.DataFrame({"c0": list(range(50)), "c1": list(range(50, 100))})
        df = with_compact_key(spark.createDataFrame(pdf), bits=8)
        keys = [r["__cck"] for r in df.collect()]
        assert len(set(keys)) == 50

    def test_three_columns(self, spark):
        pdf = pd.DataFrame(
            {"c0": [1, 1, 2], "c1": [2, 2, 3], "c2": [3, 3, 4]}
        )
        out = dedup(spark.createDataFrame(pdf), fast=True, max_value=10)
        assert out.count() == 2
