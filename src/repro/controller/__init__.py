"""Centralized controller: stats aggregation, adaptivity, experiment harness."""
from repro.controller.stats import TraceStats, intersection_function
from repro.controller.adaptivity import AdaptivityParams, AdaptiveController
from repro.controller.simulator import (
    ExperimentConfig,
    ExperimentResult,
    initial_assignment,
    run_experiment,
)

__all__ = [
    "TraceStats",
    "intersection_function",
    "AdaptivityParams",
    "AdaptiveController",
    "ExperimentConfig",
    "ExperimentResult",
    "initial_assignment",
    "run_experiment",
]
