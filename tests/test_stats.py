"""OOF StatsCollector tests (modes oof / na / fa)."""
import pandas as pd
import pytest

from repro.core.stats import StatsCollector


@pytest.fixture()
def df(spark):
    return spark.createDataFrame(pd.DataFrame({"c0": [1, 2, 3], "c1": [4, 5, 6]}))


class TestModes:
    def test_oof_counts(self, df):
        s = StatsCollector("oof")
        assert s.analyze("t", df) == 3
        assert s.rows("t") == 3
        assert s.analyze_calls == 1
        assert s.tables["t"].column_stats == {}

    def test_na_collects_nothing(self, df):
        s = StatsCollector("na")
        assert s.analyze("t", df) is None
        assert s.rows("t") is None
        assert s.analyze_calls == 0
        assert not s.enabled

    def test_fa_collects_full_stats(self, df):
        s = StatsCollector("fa")
        assert s.analyze("t", df) == 3
        cs = s.tables["t"].column_stats
        assert cs["c0"] == {"min": 1, "max": 3, "avg": 2.0}
        assert s.analyze_calls == 2  # count + full scan

    def test_invalid_mode(self):
        with pytest.raises(ValueError):
            StatsCollector("bogus")


class TestRecordAndPrealloc:
    def test_record_without_action(self, df):
        s = StatsCollector("na")
        s.record("t", 42)
        assert s.rows("t") == 42
        assert s.analyze_calls == 0

    def test_dedup_preallocation_caps_at_memory(self, df):
        s = StatsCollector("oof")
        s.record("t", 1000)
        assert s.dedup_preallocation("t", memory_budget_rows=100) == 100
        assert s.dedup_preallocation("t", memory_budget_rows=10_000) == 1000

    def test_dedup_preallocation_unknown_table(self):
        assert StatsCollector("oof").dedup_preallocation("nope") is None

    def test_latest_analyze_wins(self, spark, df):
        s = StatsCollector("oof")
        s.analyze("t", df)
        s.analyze("t", df.limit(1))
        assert s.rows("t") == 1
