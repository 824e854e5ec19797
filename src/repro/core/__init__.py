"""The paper's contribution: RAMBO, the BIGSI baseline, and the evaluation harness."""
from .bigsi import BigsiIndex
from .eval import GroundTruth, Measurement, distributed_query, ground_truth_pairs, measure, query_workload
from .experiment import ExpRow, SweepConfig, format_rows, run_scaling, run_sweep
from .rambo import RamboIndex, partition_assignments

__all__ = [
    "BigsiIndex", "RamboIndex", "partition_assignments", "GroundTruth", "Measurement",
    "distributed_query", "ground_truth_pairs", "measure", "query_workload",
    "ExpRow", "SweepConfig", "format_rows", "run_scaling", "run_sweep",
]
