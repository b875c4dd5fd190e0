"""Geabase substitute: parquet-backed entity-graph store with Spark k-hop
expansion and a driver-side online index."""
from repro.graphstore.geastore import GeaStore

__all__ = ["GeaStore"]
