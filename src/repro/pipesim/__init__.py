"""Discrete-time simulator of UNIX pipe scheduling (substrate; DESIGN.md §5).

PaSh's runtime primitives (§5) exist to fix *scheduling* pathologies of the
POSIX shell — FIFO blocking under in-order consumption, file-based buffering
races/barriers, dangling-FIFO deadlocks — none of which exist under Spark's
scheduler. This package models them: nodes with line rates, edges with
fifo / file-wait / eager buffer disciplines, in-order input consumption,
PIPE-signal semantics, and PaSh's end-of-pipeline cleanup.
"""
from .sim import SimResult, simulate, sim_from_dfg, sequential_time, RATES
from .lattice import runtime_lattice

__all__ = ["SimResult", "simulate", "sim_from_dfg", "sequential_time",
           "RATES", "runtime_lattice"]
