"""Table 3 bench: corpus generation + entropy measurement."""
from benchmarks.conftest import BENCH_SCALE, write_table

from repro.data.corpus import corpus_table


def test_table03_corpus(benchmark):
    tab = benchmark.pedantic(corpus_table, args=(BENCH_SCALE,), rounds=1, iterations=1)
    assert len(tab) == 33
    write_table("table03", tab)
