"""Simulated in-memory database (§5.1.2) tests, oracle-checked queries."""
import numpy as np
import pandas as pd
import pytest

from repro.data.corpus import generate, get_spec
from repro.dbsim.store import (
    _columns,
    format_table11,
    read_decode_query,
    store_compressed,
    table11,
)
from repro.oracle import assert_equivalent


class TestStore:
    def test_store_and_retrieve(self, spark, tmp_path):
        path = str(tmp_path / "t")
        info = store_compressed(
            spark, path, "tpcDS-web", "shf+zstd", scale=0.05, chunk_bytes=4096
        )
        assert info["n_chunks"] > 1
        assert info["comp_bytes"] > 0
        t = read_decode_query(spark, path, "tpcDS-web", "shf+zstd")
        arr = generate(get_spec("tpcDS-web"), 0.05)
        assert t.n_rows == arr.shape[0]
        assert t.read_ms > 0 and t.decode_ms > 0 and t.query_ms > 0

    def test_decode_reconstructs_exact_frame(self, spark, tmp_path):
        path = str(tmp_path / "t2")
        store_compressed(spark, path, "gas-price", "MPC", scale=0.05)
        arr = generate(get_spec("gas-price"), 0.05)
        rows = spark.read.parquet(path).orderBy("chunk_id").collect()
        from repro.codecs.base import load_codec

        codec = load_codec("MPC")
        flat = np.concatenate([codec.decompress(bytes(r.payload)) for r in rows])
        np.testing.assert_array_equal(flat, arr.reshape(-1))


class TestQueryCorrectness:
    def test_scan_matches_duckdb(self, spark):
        """The full-table-scan predicate must agree with DuckDB."""
        arr = generate(get_spec("tpcDS-web"), 0.05)
        df = pd.DataFrame(arr, columns=_columns(arr))
        v = float(np.histogram_bin_edges(df.A, bins=10)[5])
        got = df.loc[df.A <= v][["A"]].reset_index(drop=True)
        got_spark = spark.createDataFrame(got)
        assert_equivalent(
            got_spark, f"SELECT A FROM t WHERE A <= {v!r}", t=df
        )

    def test_query_count_independent_of_codec(self, spark, tmp_path):
        counts = []
        for m in ("shf+zstd", "nv::btcomp"):
            path = str(tmp_path / m.replace(":", "_"))
            store_compressed(spark, path, "tpcDS-web", m, scale=0.05)
            counts.append(read_decode_query(spark, path, "tpcDS-web", m).n_rows)
        assert counts[0] == counts[1]


class TestTable11:
    def test_small_run(self, spark, tmp_path):
        raw = table11(
            spark, str(tmp_path), ["MPC", "shf+zstd"], scale=0.05,
            datasets=["tpcDS-web", "tpcH-order"],
        )
        assert set(raw.name) == {"tpcDS-web", "tpcH-order"}
        assert raw.error.isna().all()
        fmt = format_table11(raw, ["MPC", "shf+zstd"])
        assert "query" in fmt.columns
        assert "+" in fmt.loc["tpcDS-web", "MPC"]
