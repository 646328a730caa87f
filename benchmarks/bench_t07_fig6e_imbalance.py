"""Fig 6e: workload imbalance over time (paper: Hash balanced, Domain high, Q-cut ~20%)."""
from repro.experiments import table_t07

from benchmarks._common import run_table_bench


def test_t7(benchmark, spark):
    r = run_table_bench(benchmark, spark, table_t07)
    tail = r.extras["summary"].set_index("strategy")["tail_mean"]
    assert tail["hash"] < tail["qcut+hash"] < tail["domain"]
