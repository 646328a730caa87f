"""Fig 6c: summed latency of 384 POI queries on BW (paper: Q-cut -50% vs Hash)."""
from repro.experiments import table_t05

from benchmarks._common import run_table_bench


def test_t5(benchmark, spark):
    r = run_table_bench(benchmark, spark, table_t05)
    row = r.rows.set_index("strategy")
    assert row.loc["qcut+hash", "vs_hash"] < 1.0
