"""Query-workload generation: Table II pools, Table III workloads, micros."""
from .templates import TEMPLATE_POOLS, predicate_pool, template_summary
from .generator import (
    WorkloadSpec,
    estimate_selectivities,
    generate_workload,
    skewness_factor,
    workload_summary,
)

__all__ = [
    "TEMPLATE_POOLS",
    "predicate_pool",
    "template_summary",
    "WorkloadSpec",
    "estimate_selectivities",
    "generate_workload",
    "skewness_factor",
    "workload_summary",
]
