"""Table 3: the evaluated floating-point datasets (synthetic analogs).

Prints per-dataset domain, precision, size, measured value entropy and
extent, next to the paper's size/entropy for the real dataset.
"""
from __future__ import annotations

from _common import get_spark, scale, show

from repro.data.corpus import corpus_table


def run(spark=None):
    return corpus_table(scale=scale())


if __name__ == "__main__":
    spark = get_spark("table03")
    show("Table 3: evaluated datasets (synthetic analogs)", run(spark))
    spark.stop()
