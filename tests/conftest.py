"""Test-scope tweaks: small shuffle parallelism for tiny test data.

The root conftest reads ``SPARK_SHUFFLE_PARTITIONS`` when the session
fixture first creates the SparkSession; tests run on toy inputs where
64 partitions would be pure scheduling overhead.
"""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")
