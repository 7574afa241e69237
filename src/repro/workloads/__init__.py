"""Benchmark workload registry and system runners (Section 6 harness)."""
from repro.workloads.registry import (  # noqa: F401
    SYSTEMS,
    WORKLOADS,
    Workload,
    cpu_efficiency,
    get_workload,
    run_system,
    supported,
)
