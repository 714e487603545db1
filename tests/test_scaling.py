"""Tables 7/8: parallel scaling via Spark partitions (DESIGN.md #9)."""
import pytest

from repro.core.harness import scaling_benchmark


class TestScaling:
    @pytest.fixture(scope="class")
    def table(self, spark):
        # pFPC is slow enough (MB/s) that per-chunk work dominates the
        # Spark job overhead, so real parallel speedup is observable
        return scaling_benchmark(
            spark,
            "pFPC",
            partition_counts=(1, 2, 4),
            scale=8.0,
            chunk_bytes=1 << 18,
        )

    def test_columns(self, table):
        assert {
            "partitions",
            "comp_mbs",
            "decomp_mbs",
            "comp_speedup",
            "comp_efficiency",
            "decomp_speedup",
            "decomp_efficiency",
        } <= set(table.columns)

    def test_baseline_normalised(self, table):
        assert table.comp_speedup.iloc[0] == pytest.approx(1.0)
        assert table.comp_efficiency.iloc[0] == pytest.approx(1.0)

    def test_throughput_positive(self, table):
        assert (table.comp_mbs > 0).all()
        assert (table.decomp_mbs > 0).all()

    def test_parallel_speedup_materialises(self, table):
        """Observation 7: data-parallel designs scale with workers."""
        assert table.comp_speedup.iloc[-1] > 1.2
