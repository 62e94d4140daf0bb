"""Benchmark-session knobs: small shuffle partitioning (lite graphs) set
before the session ``spark`` fixture builds the SparkSession."""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")
