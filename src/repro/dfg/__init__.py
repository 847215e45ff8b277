"""PaSh's order-aware dataflow graph model (§4.2) and the parallelization
transformations (§4.3)."""
from .graph import DFG, Edge, Node
from .transform import parallelize

__all__ = ["DFG", "Edge", "Node", "parallelize"]
