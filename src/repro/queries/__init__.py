"""Query workloads: the paper's Table II (Q1.1–Q4.4) and Table VI (EQ1–EQ4)."""
from repro.queries.workload import (
    Query,
    ALL_QUERIES,
    EXTENSION_QUERIES,
    queries_for_dataset,
    query_by_id,
)

__all__ = [
    "Query",
    "ALL_QUERIES",
    "EXTENSION_QUERIES",
    "queries_for_dataset",
    "query_by_id",
]
