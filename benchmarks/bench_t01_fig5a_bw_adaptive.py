"""Fig 5a: adaptive Q-cut over batches on BW with inter-urban disturbance."""
from repro.experiments import table_t01

from benchmarks._common import run_table_bench


def test_t1(benchmark, spark):
    r = run_table_bench(benchmark, spark, table_t01)
    assert set(r.rows["strategy"]) == {"hash", "domain", "qcut+hash", "qcut+domain"}
    assert (r.rows["phase"] == "disturb").any()
