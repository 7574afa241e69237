"""The Table 3 / Table 4 workload grid at reproduction scale.

Each :class:`Workload` pairs one benchmark Datalog program with a
dataset generator scaled to this environment (the paper's datasets and
the substitutions are documented in DESIGN.md), the set of systems that
support it (the "-" cells of Table 4 are *unsupported* cells, not
timeouts), and the paper's published CPU-efficiency row for side-by-side
recording in EXPERIMENTS.md.

``run_system`` executes one (system, workload) cell and returns the
wall-clock seconds; ``cpu_efficiency`` converts a runtime into the
paper's metric ce = 1 / (t × n_cores) (Appendix B).
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from typing import Callable

import pandas as pd
from pyspark.sql import SparkSession

from repro import synth_data
from repro.baselines import graspan_like, souffle_like
from repro.baselines.bigdatalog import BigDatalogLikeEngine
from repro.core import RecStepEngine, RecStepOptions
from repro.datalog import analyze, programs

#: systems compared in Table 4 that this repo implements (the paper's
#: Distributed-BigDatalog column needs a 15-node cluster; recorded from
#: the paper only — see DESIGN.md).
SYSTEMS = ("recstep", "bigdatalog", "souffle", "graspan")


@dataclass(frozen=True)
class Workload:
    name: str
    program: str
    dataset_label: str
    paper_dataset: str
    edb_factory: Callable[[], dict[str, pd.DataFrame]]
    systems: tuple[str, ...]
    #: Table 4 row: system -> published CPU efficiency (None = "-")
    paper_ce: dict[str, float | None]


# Scales are calibrated so that the evaluation compute dominates Spark's
# fixed per-iteration overhead (see EXPERIMENTS.md "Scale calibration"):
# smaller inputs invert the paper's ordering because a vectorized
# single-core engine beats a 16-core dataflow on trivial joins.


def _tc_edb() -> dict[str, pd.DataFrame]:
    return {"arc": synth_data.gnp_arcs(n=2000, p=0.005, seed=42)}


def _sg_edb() -> dict[str, pd.DataFrame]:
    return {"arc": synth_data.gnp_arcs(n=600, p=0.01, seed=43)}


def _reach_edb() -> dict[str, pd.DataFrame]:
    arc = synth_data.rmat_arcs(n=1_000_000, edge_factor=10, seed=44)
    return {"arc": arc, "id": pd.DataFrame({"v": [int(arc["src"].iloc[0])]})}


def _cc_edb() -> dict[str, pd.DataFrame]:
    return {"arc": synth_data.rmat_arcs(n=200_000, edge_factor=10, seed=45)}


def _sssp_edb() -> dict[str, pd.DataFrame]:
    arc = synth_data.add_weights(
        synth_data.rmat_arcs(n=200_000, edge_factor=10, seed=46), seed=46
    )
    return {"arc": arc, "id": pd.DataFrame({"v": [int(arc["src"].iloc[0])]})}


def _aa_edb() -> dict[str, pd.DataFrame]:
    return synth_data.andersen_input(scale=6, seed=47)


def _csda_edb() -> dict[str, pd.DataFrame]:
    return synth_data.csda_input(scale=2, seed=48, depth=60)


def _cspa_edb() -> dict[str, pd.DataFrame]:
    return synth_data.cspa_input(scale=0.75, seed=49)


WORKLOADS: dict[str, Workload] = {
    w.name: w
    for w in (
        Workload(
            "tc", "tc", "G2000-0.005", "G20K",
            _tc_edb,
            ("recstep", "bigdatalog", "souffle"),
            {"graspan": None, "bigdatalog": 2.75e-4, "souffle": 2.92e-4,
             "recstep": 1.12e-3},
        ),
        Workload(
            "sg", "sg", "G600-0.01", "G10K",
            _sg_edb,
            ("recstep", "bigdatalog", "souffle"),
            {"graspan": None, "bigdatalog": 7.18e-5, "souffle": 5.41e-4,
             "recstep": 2.45e-3},
        ),
        Workload(
            "reach", "reach", "RMAT-1M", "orkut",
            _reach_edb,
            ("recstep", "bigdatalog", "souffle"),
            {"graspan": None, "bigdatalog": 1.92e-4, "souffle": 3.52e-4,
             "recstep": 1.32e-3},
        ),
        Workload(
            "cc", "cc", "RMAT-200K", "orkut",
            _cc_edb,
            ("recstep", "bigdatalog"),
            {"graspan": None, "bigdatalog": 2.17e-4, "souffle": None,
             "recstep": 5.81e-4},
        ),
        Workload(
            "sssp", "sssp", "RMAT-200K", "orkut",
            _sssp_edb,
            ("recstep", "bigdatalog"),
            {"graspan": None, "bigdatalog": 1.81e-4, "souffle": None,
             "recstep": 1.00e-3},
        ),
        Workload(
            "aa", "andersen", "synthetic-6", "dataset 7",
            _aa_edb,
            ("recstep", "bigdatalog", "souffle"),
            {"graspan": None, "bigdatalog": 2.20e-4, "souffle": 5.65e-5,
             "recstep": 7.65e-4},
        ),
        Workload(
            "csda", "csda", "chains-2x60", "linux",
            _csda_edb,
            ("recstep", "bigdatalog", "souffle", "graspan"),
            {"graspan": 2.22e-6, "bigdatalog": 1.29e-4, "souffle": 2.05e-4,
             "recstep": 5.81e-5},
        ),
        Workload(
            "cspa", "cspa", "clustered-0.75", "linux",
            _cspa_edb,
            ("recstep", "souffle", "graspan"),
            {"graspan": 4.56e-5, "bigdatalog": None, "souffle": 2.03e-4,
             "recstep": 4.10e-4},
        ),
    )
}

#: paper's Distributed-BigDatalog column (cluster-only; not reproduced)
PAPER_DISTRIBUTED_BIGDATALOG_CE = {
    "tc": 4.39e-4, "sg": 3.47e-4, "reach": 4.17e-4, "cc": 2.53e-4,
    "sssp": 2.14e-4, "aa": None, "csda": None, "cspa": None,
}


def get_workload(name: str) -> Workload:
    return WORKLOADS[name]


def supported(system: str, workload: str) -> bool:
    return system in WORKLOADS[workload].systems


class UnsupportedCellError(ValueError):
    """Raised for a '-' cell of Table 4."""


def system_cores(system: str, spark: SparkSession | None) -> int:
    """Cores charged in ce = 1/(t·n).

    Appendix B defines n as "the number of CPU cores *given* for
    computation" — every system in the paper was given the whole
    machine, whether it used the cores or not (that is the point of the
    metric: Souffle's poor parallelization shows up as low ce). All
    systems are therefore charged the machine's core count.
    """
    if spark is not None:
        return spark.sparkContext.defaultParallelism
    import os

    return os.cpu_count() or 1


def cpu_efficiency(runtime_s: float, cores: int) -> float:
    """Appendix B: ce = 1 / (t · n)."""
    return 1.0 / (runtime_s * cores)


def run_system(
    system: str,
    workload_name: str,
    spark: SparkSession | None = None,
    *,
    edb: dict[str, pd.DataFrame] | None = None,
) -> float:
    """Run one Table 4 cell end-to-end; returns wall-clock seconds.

    The timed region covers program analysis + evaluation + result
    materialization (the paper times load-to-store; our inputs are
    in-memory frames on all systems alike). Raises
    :class:`UnsupportedCellError` for "-" cells.
    """
    w = WORKLOADS[workload_name]
    if system not in w.systems:
        raise UnsupportedCellError(f"{system} does not support {workload_name}")
    edb = edb if edb is not None else w.edb_factory()
    program = programs.get_program(w.program)

    if system in ("recstep", "bigdatalog"):
        assert spark is not None, f"{system} needs a SparkSession"
        sdf = {k: spark.createDataFrame(v) for k, v in edb.items()}
        if system == "recstep":
            engine = RecStepEngine(spark, RecStepOptions(pbme=True))
        else:
            engine = BigDatalogLikeEngine(spark)
        t0 = time.perf_counter()
        out = engine.evaluate(program, sdf)
        for df in out.values():
            df.count()  # materialize results (write-back analogue)
        return time.perf_counter() - t0

    if system == "souffle":
        eng = souffle_like.SouffleLikeEngine(allow_recursive_aggregation=False)
        analyzed = analyze(program)
        t0 = time.perf_counter()
        out = eng.evaluate(analyzed, edb)
        for df in out.values():
            len(df)
        return time.perf_counter() - t0

    if system == "graspan":
        t0 = time.perf_counter()
        if workload_name == "csda":
            graspan_like.solve_csda(edb)
        elif workload_name == "cspa":
            graspan_like.solve_cspa(edb)
        else:  # pragma: no cover - guarded by `supported`
            raise UnsupportedCellError("graspan handles only CSDA/CSPA")
        return time.perf_counter() - t0

    raise ValueError(f"unknown system {system!r}")
