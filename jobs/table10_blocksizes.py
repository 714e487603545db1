"""Table 10: compression performance under 4K / 64K / 8M block sizes
(Observation 8: compressors prefer larger block sizes)."""
from __future__ import annotations

from _common import get_spark, repeats, scale, show

from repro.core.tables import table10


def run(spark):
    return table10(spark, scale=scale(), repeats=repeats())


if __name__ == "__main__":
    spark = get_spark("table10")
    show("Table 10: performance under different block sizes", run(spark))
    spark.stop()
