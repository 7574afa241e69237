"""Workload registry and jobs/ entrypoint tests."""
import pandas as pd
import pytest

from repro.workloads.registry import (
    PAPER_DISTRIBUTED_BIGDATALOG_CE,
    SYSTEMS,
    WORKLOADS,
    UnsupportedCellError,
    cpu_efficiency,
    get_workload,
    run_system,
    supported,
    system_cores,
)

import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent.parent / "jobs"))

import table1_feature_matrix
import table3_workload_summary
import table4_cpu_efficiency


class TestRegistryShape:
    def test_all_eight_workloads(self):
        assert set(WORKLOADS) == {
            "tc", "sg", "reach", "cc", "sssp", "aa", "csda", "cspa"
        }

    def test_dash_cells_match_paper_table4(self):
        """Our supported-matrix must agree with the paper's '-' cells."""
        for wname, w in WORKLOADS.items():
            for system in SYSTEMS:
                paper_has_number = w.paper_ce.get(system) is not None
                assert paper_has_number == supported(system, wname), (
                    f"{system}/{wname}: paper={'num' if paper_has_number else '-'} "
                    f"but supported={supported(system, wname)}"
                )

    def test_every_workload_runs_on_recstep(self):
        for wname in WORKLOADS:
            assert supported("recstep", wname)

    def test_graspan_only_program_analysis(self):
        assert {w for w in WORKLOADS if supported("graspan", w)} == {"csda", "cspa"}

    def test_souffle_no_recursive_aggregation(self):
        assert not supported("souffle", "cc")
        assert not supported("souffle", "sssp")

    def test_bigdatalog_no_mutual_recursion(self):
        assert not supported("bigdatalog", "cspa")

    def test_distributed_bigdatalog_rows_recorded(self):
        assert PAPER_DISTRIBUTED_BIGDATALOG_CE["tc"] == pytest.approx(4.39e-4)

    def test_edb_factories_are_deterministic(self):
        for wname in ("tc", "aa", "cspa"):
            a = get_workload(wname).edb_factory()
            b = get_workload(wname).edb_factory()
            for k in a:
                pd.testing.assert_frame_equal(a[k], b[k])

    def test_cpu_efficiency_formula(self):
        # Appendix B: ce = 1/(t·n).
        assert cpu_efficiency(10.0, 16) == pytest.approx(1 / 160)

    def test_system_cores_charges_given_cores(self, spark):
        # Appendix B: n = cores *given*, the same machine for everyone.
        n = spark.sparkContext.defaultParallelism
        assert system_cores("recstep", spark) == n
        assert system_cores("souffle", spark) == n
        import os

        assert system_cores("graspan", None) == os.cpu_count()


class TestRunSystem:
    def test_unsupported_cell_raises(self, spark):
        with pytest.raises(UnsupportedCellError):
            run_system("graspan", "tc", spark)

    def test_small_cells_run(self, spark):
        # Tiny stand-in EDBs so the smoke run stays fast.
        tiny = {"arc": pd.DataFrame({"src": [0, 1, 2], "dst": [1, 2, 3]})}
        t = run_system("recstep", "tc", spark, edb=tiny)
        assert t > 0
        t = run_system("souffle", "tc", None, edb=tiny)
        assert t > 0
        t = run_system("bigdatalog", "tc", spark, edb=tiny)
        assert t > 0

    def test_graspan_cells_run(self):
        from repro import synth_data

        t = run_system("graspan", "csda", None,
                       edb=synth_data.csda_input(scale=1, depth=10))
        assert t > 0


class TestJobs:
    def test_table1_matrix(self):
        table = table1_feature_matrix.main()
        # Probed rows must reflect the implementations:
        assert "Mutual Recursion" in table
        for line in table.splitlines():
            if line.startswith("Mutual Recursion"):
                cells = line.split()
                assert "no" in cells  # bigdatalog
            if line.startswith("Recursive Aggregation"):
                assert "no" in line and "yes" in line

    def test_table3_summary(self):
        table = table3_workload_summary.main()
        assert "Transitive Closure (TC)" in table
        assert "mutual" in table  # CSPA row
        assert "linear" in table
        assert "G20K" in table  # paper dataset column

    def test_table4_format(self):
        results = {
            "tc": {
                "recstep": {"runtime_s": 2.0, "cores": 16, "ce": 1 / 32},
                "souffle": {"runtime_s": 4.0, "cores": 1, "ce": 0.25},
            }
        }
        table = table4_cpu_efficiency.format_table(results)
        assert "paper" in table and "measured" in table
        assert "1.12e-03" in table  # paper's RecStep TC number

    def test_table4_main_on_tiny_subset(self, spark, monkeypatch):
        # Patch the TC workload to a tiny graph, then run the real harness.
        from repro.workloads import registry

        tiny = registry.Workload(
            "tc", "tc", "tiny", "G20K",
            lambda: {"arc": pd.DataFrame({"src": [0, 1], "dst": [1, 2]})},
            ("recstep", "souffle"),
            {"recstep": 1.12e-3, "souffle": 2.92e-4},
        )
        monkeypatch.setitem(registry.WORKLOADS, "tc", tiny)
        monkeypatch.setitem(table4_cpu_efficiency.WORKLOADS, "tc", tiny)
        out = table4_cpu_efficiency.main(spark, ["tc"])
        assert set(out["tc"]) == {"recstep", "souffle"}
        assert out["tc"]["recstep"]["ce"] > 0
