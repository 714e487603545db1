"""Table 6 bench: end-to-end wall time incl. modeled host↔device copies."""
from benchmarks.conftest import write_table

from repro.core.tables import table6


def test_table06_walltime(benchmark, sweep_metrics):
    t6 = benchmark.pedantic(table6, args=(sweep_metrics,), rounds=1, iterations=1)
    assert not any(c.startswith("nv::") for c in t6.columns)
    # Observation 5: serial codecs dominate wall time despite PCIe modeling
    assert t6.loc["avg. comp", "Gorilla"] > t6.loc["avg. comp", "MPC"]
    write_table("table06", t6)
