"""Graph substrate: edge-list graphs (local numpy + Spark DataFrame views),
synthetic generators, and dataset statistics."""
from repro.graphs.edgelist import LocalGraph, SparkGraph  # noqa: F401
