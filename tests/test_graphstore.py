"""Tests for GeaStore (the Geabase substitute)."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.graphstore import GeaStore
from repro.oracle import assert_equivalent


@pytest.fixture()
def store(spark, tmp_path):
    s = GeaStore(spark, tmp_path / "graph")
    # path graph 0-1-2-3-4 plus branch 1-5
    s.put_relations(pd.DataFrame({"src": [0, 1, 2, 3, 1], "dst": [1, 2, 3, 4, 5]}))
    return s


def test_put_relations_symmetrizes(store):
    pdf = store.edges().toPandas()
    pairs = set(zip(pdf["src"], pdf["dst"]))
    assert (1, 0) in pairs and (0, 1) in pairs
    assert len(pdf) == 10


def test_k_hop_spark(store):
    got = store.k_hop([0], 2).toPandas().sort_values("entity_id")
    expect = {0: 0, 1: 1, 2: 2, 5: 2}
    assert dict(zip(got["entity_id"], got["hop"])) == expect


def test_k_hop_spark_matches_duckdb(store, spark):
    """2-hop expansion checked against an explicit DuckDB SQL reachability."""
    got = store.k_hop([0], 2)
    edges = store.edges()
    assert_equivalent(
        got,
        """
        WITH h0 AS (SELECT 0::BIGINT AS entity_id),
        h1 AS (
          SELECT DISTINCT e.dst AS entity_id FROM edges e JOIN h0 ON e.src = h0.entity_id
          WHERE e.dst NOT IN (SELECT entity_id FROM h0)
        ),
        h2 AS (
          SELECT DISTINCT e.dst AS entity_id FROM edges e JOIN h1 ON e.src = h1.entity_id
          WHERE e.dst NOT IN (SELECT entity_id FROM h0)
            AND e.dst NOT IN (SELECT entity_id FROM h1)
        )
        SELECT entity_id, 0::BIGINT AS hop FROM h0
        UNION ALL SELECT entity_id, 1 FROM h1
        UNION ALL SELECT entity_id, 2 FROM h2
        """,
        edges=edges,
    )


def test_k_hop_online_matches_spark(store):
    hops = store.k_hop_online([0], 3)
    spark_hops = dict(
        zip(*(lambda p: (p["entity_id"], p["hop"]))(store.k_hop([0], 3).toPandas()))
    )
    assert hops == {int(k): int(v) for k, v in spark_hops.items()}


def test_k_hop_multiple_seeds(store):
    hops = store.k_hop_online([0, 4], 1)
    assert hops == {0: 0, 4: 0, 1: 1, 3: 1}


def test_neighbors(store):
    assert store.neighbors(1) == [0, 2, 5]
    assert store.neighbors(99) == []


def test_overwrite_relations(store, spark):
    store.put_relations(pd.DataFrame({"src": [7], "dst": [8]}))
    assert store.neighbors(7) == [8]
    assert store.neighbors(1) == []


def test_k_hop_disconnected(store):
    hops = store.k_hop_online([5], 0)
    assert hops == {5: 0}
