"""Fig 7: scale-out on C1 for k in {2,4,8,16} (paper: Hash non-monotone, Q-cut best)."""
from repro.experiments import table_t10

from benchmarks._common import run_table_bench


def test_t10(benchmark, spark):
    r = run_table_bench(benchmark, spark, table_t10)
    sssp = r.rows[(r.rows.kind == "sssp")].set_index(["strategy", "k"])["total_latency"]
    assert sssp["hash", 8] < sssp["hash", 2], "Hash must gain from 2->8 workers"
    assert sssp["hash", 16] > sssp["hash", 8], "Hash must degrade at k=16 (NIC sharing)"
    assert sssp["domain", 16] < sssp["domain", 2], "Domain must keep scaling"
    assert sssp["qcut+hash", 8] < sssp["hash", 8], "Q-cut must beat Hash at k=8"
