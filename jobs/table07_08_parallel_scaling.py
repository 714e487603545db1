"""Tables 7 & 8: parallel compression/decompression throughput scaling.

Threads → Spark partitions (DESIGN.md substitution #9) for the four
parallel-capable methods of the paper.
"""
from __future__ import annotations

import os

from _common import get_spark, show

from repro.core.harness import scaling_benchmark

METHODS = ["pFPC", "shf+LZ4", "shf+zstd", "ndzip-C"]
PARTITIONS = (1, 2, 4, 8, 16, 24, 32, 48)


def run(spark):
    import pandas as pd

    sc = float(os.environ.get("REPRO_SCALING_SCALE", "24"))
    frames = []
    for m in METHODS:
        t = scaling_benchmark(spark, m, PARTITIONS, scale=sc, chunk_bytes=1 << 18)
        t.insert(0, "method", m)
        frames.append(t)
    return pd.concat(frames, ignore_index=True)


if __name__ == "__main__":
    spark = get_spark("table07_08")
    t = run(spark)
    show("Table 7: parallel compression throughput (MB/s, speedup, efficiency)",
         t[["method", "partitions", "comp_mbs", "comp_speedup", "comp_efficiency"]])
    show("Table 8: parallel decompression throughput (MB/s, speedup, efficiency)",
         t[["method", "partitions", "decomp_mbs", "decomp_speedup", "decomp_efficiency"]])
    spark.stop()
