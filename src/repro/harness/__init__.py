"""Experiment harness: workload builders, system runners, table formatting."""
from repro.harness.workloads import Workload, make_workload  # noqa: F401
from repro.harness.runner import run_config  # noqa: F401
