"""Fig 6f: query locality over time (paper: Hash 38%, Q-cut ->80%, Domain >95%)."""
from repro.experiments import table_t08

from benchmarks._common import run_table_bench


def test_t8(benchmark, spark):
    r = run_table_bench(benchmark, spark, table_t08)
    tail = r.extras["summary"].set_index("strategy")["tail_mean"]
    assert tail["hash"] < tail["qcut+hash"] < tail["domain"]
