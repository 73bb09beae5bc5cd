"""Micro-batch execution engine for CLASH topologies on Spark.

Substitutes the paper's Storm cluster: stores are Spark DataFrames,
probe steps are partitioned equi-joins with window predicates, and the
probe traffic the ILP minimizes (tuples routed between stores, with
broadcast factors) is measured exactly per step and per epoch."""
from .executor import Engine, EngineRun
from .metrics import BatchMetrics, LatencyModel, LatencyPoint

__all__ = ["Engine", "EngineRun", "BatchMetrics", "LatencyModel", "LatencyPoint"]
