"""Multi-query vertex-centric BSP engine on Spark DataFrames."""
from repro.engine.pregel import run_queries
from repro.engine.trace import Trace, cached_trace
from repro.engine.vertex_programs import init_state, targets_for

__all__ = ["run_queries", "Trace", "cached_trace", "init_state", "targets_for"]
