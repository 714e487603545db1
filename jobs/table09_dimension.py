"""Table 9: dimension information's influence on compression ratios.

Harmonic-mean CR with (md) and without (1d) dimensionality metadata for
the five dimension-aware methods, plus Mann-Whitney U p-values
(Observation 6: no significant difference).
"""
from __future__ import annotations

from _common import get_spark, repeats, scale, show

from repro.core.tables import table9


def run(spark):
    return table9(spark, scale=scale(), repeats=repeats())


if __name__ == "__main__":
    spark = get_spark("table09")
    show("Table 9: dimension info influence on CR (md vs 1d)", run(spark))
    spark.stop()
