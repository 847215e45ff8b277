"""Parallelizability annotation language (§3.2) and command study (§3.1).

Annotation records are JSON-serializable dicts with flag-predicate clauses
that resolve a concrete invocation (command + argv) to its parallelizability
class, its ordered streaming inputs, its static "configuration" inputs, its
outputs, and — for class P — the map/aggregate decomposition PaSh uses in
the parallelization transformation (§4.3).
"""
from .model import (
    CLASS_E,
    CLASS_N,
    CLASS_P,
    CLASS_S,
    Resolved,
    resolve,
    resolve_invocation,
)
from .library import LIBRARY
from . import study

__all__ = [
    "CLASS_S", "CLASS_P", "CLASS_N", "CLASS_E",
    "Resolved", "resolve", "resolve_invocation", "LIBRARY", "study",
]
