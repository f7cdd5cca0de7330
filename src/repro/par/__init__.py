"""Parallelization substrate: load balancing + Spark task fan-out."""
from repro.par.partition import lpt_assign
from repro.par.spark_map import run_tasks

__all__ = ["lpt_assign", "run_tasks"]
