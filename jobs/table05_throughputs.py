"""Table 5: average compression & decompression throughput (GB/s)."""
from __future__ import annotations

from _common import get_spark, repeats, scale, show

from repro.core.tables import full_sweep, metrics_pdf, table5


def run(spark):
    m = metrics_pdf(full_sweep(spark, scale=scale(), repeats=repeats()))
    return table5(m)


if __name__ == "__main__":
    spark = get_spark("table05")
    show("Table 5: (de)compression throughput (GB/s)", run(spark))
    spark.stop()
