"""pytest-benchmark harness for Table 4 (CPU efficiency).

One benchmark per supported (workload × system) cell, same cells as the
paper's Table 4 (the missing combinations are the paper's "-" cells and
are skipped explicitly). Each benchmark reports wall-clock time; the
derived ce = 1/(t × n) values are attached to ``benchmark.extra_info``
together with the paper's published number for that cell, so the
pytest-benchmark output is the paper-vs-measured record.

Runtimes span ~0.1 s (graspan/souffle on small inputs) to ~2 min
(iteration-heavy CSDA on Spark), so every cell runs exactly once
(``pedantic`` with one round) — these are macro-benchmarks, not
micro-benchmarks.
"""
import pytest

from repro.workloads.registry import (
    SYSTEMS,
    WORKLOADS,
    cpu_efficiency,
    run_system,
    supported,
    system_cores,
)

CELLS = [
    (wname, system)
    for wname in WORKLOADS
    for system in SYSTEMS
    if supported(system, wname)
]


@pytest.fixture(scope="module")
def edbs():
    """Generate every workload's EDB once per module (off the clock)."""
    return {wname: WORKLOADS[wname].edb_factory() for wname in WORKLOADS}


@pytest.mark.parametrize(
    "workload,system", CELLS, ids=[f"{w}-{s}" for w, s in CELLS]
)
def test_table4_cell(benchmark, spark, edbs, workload, system):
    runtime_holder = {}

    def run():
        runtime_holder["t"] = run_system(
            system, workload, spark, edb=edbs[workload]
        )

    benchmark.pedantic(run, rounds=1, iterations=1)
    cores = system_cores(system, spark)
    ce = cpu_efficiency(runtime_holder["t"], cores)
    w = WORKLOADS[workload]
    benchmark.extra_info.update(
        {
            "workload": workload,
            "system": system,
            "dataset": w.dataset_label,
            "paper_dataset": w.paper_dataset,
            "cores": cores,
            "runtime_s": runtime_holder["t"],
            "cpu_efficiency": ce,
            "paper_cpu_efficiency": w.paper_ce.get(system),
        }
    )


@pytest.mark.parametrize(
    "workload,system",
    [(w, s) for w in WORKLOADS for s in SYSTEMS if not supported(s, w)],
    ids=[
        f"{w}-{s}-unsupported"
        for w in WORKLOADS
        for s in SYSTEMS
        if not supported(s, w)
    ],
)
def test_table4_dash_cells_match_paper(workload, system):
    """The '-' cells: the paper leaves them blank because the system
    cannot run the workload; our stand-ins must refuse the same cells."""
    w = WORKLOADS[workload]
    assert w.paper_ce.get(system) is None
