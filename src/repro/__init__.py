"""FCBench (VLDB 2024) reproduction.

Lossless floating-point compression benchmarking across HPC, time-series,
observation, and database domains, run as per-partition codec UDFs inside
Spark executors with Spark SQL metric aggregation.
"""

__version__ = "0.1.0"
