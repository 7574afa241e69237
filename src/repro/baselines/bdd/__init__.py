"""BDDBDDB-like substrate: relations as reduced ordered BDDs.

BDDBDDB [26] represents program-analysis relations as binary decision
diagrams and evaluates Datalog by BDD operations. The comparator is
closed/ancient, so :mod:`repro.baselines.bdd.bdd` implements a ROBDD
package from scratch (hash-consed node table, memoized apply, exists,
order-preserving rename) and :mod:`repro.baselines.bdd.engine` evaluates
linear binary-chain Datalog (TC / REACH-as-closure / CSDA) semi-naively
over it — enough to reproduce the paper's qualitative finding that the
BDD approach only pays off on small, well-ordered active domains and is
orders of magnitude slower elsewhere.
"""
from repro.baselines.bdd.bdd import BDD  # noqa: F401
from repro.baselines.bdd.engine import BddClosureEngine  # noqa: F401
