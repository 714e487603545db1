"""Table 6: end-to-end wall time (ms), GPU methods including modeled
host-to-device / device-to-host transfers (Observation 5)."""
from __future__ import annotations

from _common import get_spark, repeats, scale, show

from repro.core.tables import full_sweep, metrics_pdf, table6


def run(spark):
    m = metrics_pdf(full_sweep(spark, scale=scale(), repeats=repeats()))
    return table6(m)


if __name__ == "__main__":
    spark = get_spark("table06")
    show("Table 6: end-to-end wall time (ms)", run(spark))
    spark.stop()
