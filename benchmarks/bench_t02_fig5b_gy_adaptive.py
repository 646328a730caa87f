"""Fig 5b: adaptive Q-cut over batches on GY with inter-urban disturbance."""
from repro.experiments import table_t02

from benchmarks._common import run_table_bench


def test_t2(benchmark, spark):
    r = run_table_bench(benchmark, spark, table_t02)
    assert set(r.rows["strategy"]) == {"hash", "domain", "qcut+hash", "qcut+domain"}
