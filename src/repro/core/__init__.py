"""RecStep core: the paper's contribution, rebuilt on Spark SQL.

Datalog programs are compiled to DataFrame plans (:mod:`compiler`),
evaluated semi-naively per stratum by the interpreter (:mod:`engine`,
Algorithm 1 of the paper), with the paper's optimizations implemented in
:mod:`setdiff` (DSD), :mod:`dedup` (FAST-DEDUP), :mod:`stats` (OOF), the
engine itself (UIE, EOST), and :mod:`pbme` (Parallel Bit-Matrix
Evaluation for TC/SG).
"""
from repro.core.options import RecStepOptions  # noqa: F401
from repro.core.engine import RecStepEngine  # noqa: F401
