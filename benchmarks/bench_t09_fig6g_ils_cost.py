"""Fig 6g: ILS best-cost trace on the Hash-partitioned BW stats (paper: >75% cost cut)."""
from repro.experiments import table_t09

from benchmarks._common import run_table_bench


def test_t9(benchmark, spark):
    r = run_table_bench(benchmark, spark, table_t09)
    assert r.extras["reduction"] > 0.5
    assert len(r.rows) >= 2
