"""Table 3 reproduction: the benchmark program x dataset matrix.

Prints, from the live registry, each Datalog program with its datasets
(reproduction-scale label + the paper's original dataset) and the rule
counts/structural class computed by the analyzer — the same summary the
paper's Table 3 gives, grounded in what this repo actually runs.

Usage: ``spark-submit jobs/table3_workload_summary.py`` (no Spark work).
"""
from repro.datalog import analyze, programs
from repro.workloads.registry import WORKLOADS

TITLES = {
    "tc": "Transitive Closure (TC)",
    "sg": "Same Generation (SG)",
    "reach": "Reachability (REACH)",
    "cc": "Connected Components (CC)",
    "sssp": "Single Source Shortest Path (SSSP)",
    "aa": "Andersen's Analysis (AA)",
    "csda": "Context-sensitive Dataflow Analysis (CSDA)",
    "cspa": "Context-sensitive Points-to Analysis (CSPA)",
}


def main(spark=None) -> str:
    lines = [
        f"{'Program':<46}{'Dataset (repro)':<18}{'Dataset (paper)':<18}"
        f"{'rules':>6}{'recursion':>12}{'agg':>6}"
    ]
    lines.append("-" * len(lines[0]))
    for wname, w in WORKLOADS.items():
        a = analyze(programs.get_program(w.program))
        if a.has_mutual_recursion:
            rec = "mutual"
        elif a.has_nonlinear_recursion:
            rec = "nonlinear"
        elif any(s.recursive for s in a.strata):
            rec = "linear"
        else:
            rec = "none"
        agg = "rec" if a.meld_idbs else ("yes" if a.agg_specs else "no")
        lines.append(
            f"{TITLES[wname]:<46}{w.dataset_label:<18}{w.paper_dataset:<18}"
            f"{len(a.program.rules):>6}{rec:>12}{agg:>6}"
        )
    table = "\n".join(lines)
    print(table)
    return table


if __name__ == "__main__":
    main()
