"""Fig 6b: summed latency of 384 SSSP queries on GY (paper: Q-cut -13% vs Hash)."""
from repro.experiments import table_t04

from benchmarks._common import run_table_bench


def test_t4(benchmark, spark):
    r = run_table_bench(benchmark, spark, table_t04)
    row = r.rows.set_index("strategy")
    assert row.loc["qcut+hash", "vs_hash"] < 1.0
