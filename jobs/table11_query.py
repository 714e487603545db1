"""Table 11: read + decode + query time on the TPC datasets in the
simulated in-memory database (§5.1.2 / §6.2.2)."""
from __future__ import annotations

import os
import tempfile

from _common import get_spark, scale, show

from repro.core.tables import TABLE11_METHODS
from repro.dbsim.store import format_table11, table11


def run(spark, workdir=None):
    workdir = workdir or tempfile.mkdtemp(prefix="fcbench_dbsim_")
    raw = table11(spark, workdir, TABLE11_METHODS, scale=scale())
    return raw, format_table11(raw, TABLE11_METHODS)


if __name__ == "__main__":
    spark = get_spark("table11")
    raw, fmt = run(spark)
    show("Table 11: read+decode and query time (ms) from blob files", fmt)
    means = raw.groupby("method")[["read_ms", "decode_ms"]].sum().sum(axis=1) / raw.name.nunique()
    show("arithmetic mean total retrieval (ms) per method", means.to_frame("mean_ms").T)
    spark.stop()
