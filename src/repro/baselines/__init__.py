"""Baseline Datalog engines the paper compares RecStep against.

Each module re-implements the *algorithmic profile* of one comparator
system (all of which are closed-source/unavailable offline — see
DESIGN.md "Substrates built"):

- :mod:`repro.baselines.naive` — naive bottom-up evaluation (Section 3.2),
  the textbook baseline semi-naive improves on;
- :mod:`repro.baselines.bigdatalog` — Datalog-on-Spark with RecStep's
  optimizations disabled and no mutual recursion (BigDatalog-like);
- :mod:`repro.baselines.souffle_like` — single-process in-memory tabular
  semi-naive engine (Souffle-like profile; also the reference oracle);
- :mod:`repro.baselines.graspan_like` — single-threaded worklist engine
  over binary chain grammars (Graspan-like profile);
- :mod:`repro.baselines.bdd` — ROBDD-backed evaluation (BDDBDDB-like).
"""
