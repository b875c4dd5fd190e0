"""GeaStore — the Geabase substitute (entity graph storage system).

The paper stores the mined entity graph in Geabase, Ant's distributed graph
database, and serves k-hop expansion queries online. GeaStore reproduces the
API surface over the local filesystem:

* ``put_relations`` persists the (undirected) relation set as parquet via
  Spark, symmetrized to an adjacency edge list;
* ``k_hop`` answers hop-bounded expansion with iterative Spark joins (the
  offline / analytical path, oracle-checkable against DuckDB);
* ``build_index`` materializes a driver-side adjacency index giving the
  millisecond-latency lookups the online reasoning module needs (playing
  the role of Geabase's serving replicas).
"""
from __future__ import annotations

from pathlib import Path

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


class GeaStore:
    """Parquet-backed entity-graph store with Spark and in-memory queries."""

    def __init__(self, spark: SparkSession, path: str | Path):
        self.spark = spark
        self.path = str(path)
        self._index: dict[int, list[int]] | None = None

    # ------------------------------------------------------------ storage
    def put_relations(self, relations: pd.DataFrame) -> None:
        """Persist undirected relations (src, dst); stored symmetrized."""
        rel = relations[["src", "dst"]].astype(np.int64)
        sym = pd.concat(
            [rel, rel.rename(columns={"src": "dst", "dst": "src"})[["src", "dst"]]]
        ).drop_duplicates()
        sdf = self.spark.createDataFrame(sym)
        sdf.write.mode("overwrite").parquet(self.path)
        self._index = None

    def edges(self) -> DataFrame:
        return self.spark.read.parquet(self.path)

    # ------------------------------------------------------- offline query
    def k_hop(self, seeds: list[int], k: int) -> DataFrame:
        """(entity_id, hop) for all entities within k hops of ``seeds``.

        hop = length of the shortest path from the seed set (0 for seeds),
        computed with iterative frontier joins — pure Spark dataflow.
        """
        edges = self.edges()
        frontier = self.spark.createDataFrame(
            pd.DataFrame({"entity_id": np.asarray(seeds, dtype=np.int64)})
        ).distinct()
        visited = frontier.withColumn("hop", F.lit(0))
        for hop in range(1, k + 1):
            nxt = (
                edges.join(frontier, edges.src == frontier.entity_id)
                .select(F.col("dst").alias("entity_id"))
                .distinct()
                .join(visited.select("entity_id"), on="entity_id", how="left_anti")
            )
            if nxt.isEmpty():
                break
            visited = visited.unionByName(nxt.withColumn("hop", F.lit(hop)))
            frontier = nxt
        return visited

    # -------------------------------------------------------- online query
    def build_index(self) -> None:
        """Load the adjacency into driver memory for online-latency lookups."""
        pdf = self.edges().toPandas()
        idx: dict[int, list[int]] = {}
        for s, d in zip(pdf["src"].to_numpy(), pdf["dst"].to_numpy()):
            idx.setdefault(int(s), []).append(int(d))
        self._index = idx

    def neighbors(self, entity: int) -> list[int]:
        if self._index is None:
            self.build_index()
        return sorted(self._index.get(int(entity), []))

    def k_hop_online(self, seeds: list[int], k: int, cap_per_hop: int = 500) -> dict[int, int]:
        """In-memory BFS: entity → hop, for the online reasoning path."""
        if self._index is None:
            self.build_index()
        hops = {int(s): 0 for s in seeds}
        frontier = list(hops)
        for hop in range(1, k + 1):
            nxt: list[int] = []
            for u in frontier:
                for v in self._index.get(u, []):
                    if v not in hops:
                        hops[v] = hop
                        nxt.append(v)
            if len(nxt) > cap_per_hop:
                nxt = nxt[:cap_per_hop]
            frontier = nxt
            if not frontier:
                break
        return hops
