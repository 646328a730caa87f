"""Fig 6d: hybrid vs traditional global barrier, 64 SSSP on BW (M1)."""
from repro.experiments import table_t06

from benchmarks._common import run_table_bench


def test_t6(benchmark, spark):
    r = run_table_bench(benchmark, spark, table_t06)
    assert (r.rows["speedup_hybrid"] >= 1.0).all(), "hybrid must not be slower than global"
