"""Spade core: peeling algorithms, incremental engine, metrics, simulator.

This package is the paper's primary contribution (Sections 3-4): the
static peeling baseline (Algorithm 1), the plug-in suspiciousness
metrics (DG/DW/FD), the incremental Spade engine (single-edge
reordering, Algorithm 2 batch reordering, edge grouping), a
greedy-sequence validator used as a correctness oracle, and the
latency/prevention discrete-event simulator for Table 5.
"""
from repro.core.susp import DG, DW, FD, Metric, metric_by_name
from repro.core.peel import PeelResult, best_community, peel_sequence
from repro.core.engine import SpadeEngine
from repro.core.validate import validate_peeling

__all__ = [
    "DG",
    "DW",
    "FD",
    "Metric",
    "metric_by_name",
    "PeelResult",
    "best_community",
    "peel_sequence",
    "SpadeEngine",
    "validate_peeling",
]
