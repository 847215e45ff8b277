"""PaSh runtime component (§5): the aggregator library, split semantics,
and the Spark realization of streams (eager ≙ materialized buffers)."""
from .aggregators import AGGREGATORS, aggregate

__all__ = ["AGGREGATORS", "aggregate"]
