"""Fig 6a: summed latency of 384 SSSP queries on BW (paper: Q-cut -43% vs Hash)."""
from repro.experiments import table_t03

from benchmarks._common import run_table_bench


def test_t3(benchmark, spark):
    r = run_table_bench(benchmark, spark, table_t03)
    row = r.rows.set_index("strategy")
    assert row.loc["qcut+hash", "vs_hash"] < 0.85, "Q-cut must clearly beat static Hash"
