"""User entity preference (Sec. III-C, Eq. 7) — pure Spark dataflow.

Inputs: the user entity sequences from the extractor and the entity
embeddings h_e stored by the ensemble stage. The user embedding r_u is the
element-wise mean of h_e over the user's entity sequence; the preference
score for (user, entity) is the dot product r_u · h_e.

This module is the paper's daily pre-compute: it runs as distributed
DataFrame transformations (mapInPandas with the embedding matrix broadcast)
so the per-user aggregation shuffles through Spark, and both outputs are
oracle-checkable against DuckDB SQL over the exploded embedding table.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T


def user_embeddings(sequences: DataFrame, h_e: np.ndarray) -> DataFrame:
    """r_u per user: mean of h_e over all entities the user mentioned.

    ``sequences`` is (user_id, week, entity_seq); all weeks contribute (the
    paper uses the rolling 30-day window). Output: (user_id, r array<double>).
    """
    d = h_e.shape[1]
    bc = sequences.sparkSession.sparkContext.broadcast(h_e)
    schema = T.StructType(
        [
            T.StructField("user_id", T.LongType()),
            T.StructField("r", T.ArrayType(T.DoubleType())),
        ]
    )

    mentions = sequences.select(
        "user_id", F.explode("entity_seq").alias("entity_id")
    )

    def agg(key, pdf):
        emb = bc.value
        rows = emb[pdf["entity_id"].to_numpy()]
        return pd.DataFrame({"user_id": [key[0]], "r": [rows.mean(axis=0).tolist()]})

    return mentions.groupBy("user_id").applyInPandas(agg, schema=schema)


def preference_scores(
    users: DataFrame, entity_ids: np.ndarray, h_e: np.ndarray
) -> DataFrame:
    """s_<u,e> = r_u · h_e for every user × chosen entity.

    ``users`` is the output of :func:`user_embeddings`; ``entity_ids`` the
    (small) set of entities a marketer selected. Output:
    (user_id, entity_id, score), one row per pair — computed distributed
    with the chosen embedding blocks broadcast.
    """
    ids = np.asarray(entity_ids, dtype=np.int64)
    bc = users.sparkSession.sparkContext.broadcast((ids, h_e[ids]))
    schema = T.StructType(
        [
            T.StructField("user_id", T.LongType()),
            T.StructField("entity_id", T.LongType()),
            T.StructField("score", T.DoubleType()),
        ]
    )

    def run(iterator):
        eids, emb = bc.value
        for pdf in iterator:
            if len(pdf) == 0:
                continue
            r = np.stack(pdf["r"].to_numpy())  # (u, d)
            scores = r @ emb.T  # (u, k)
            u_rep = np.repeat(pdf["user_id"].to_numpy(), len(eids))
            e_rep = np.tile(eids, len(pdf))
            yield pd.DataFrame(
                {"user_id": u_rep, "entity_id": e_rep, "score": scores.reshape(-1)}
            )

    return users.mapInPandas(run, schema=schema)


def top_k_users(scores: DataFrame, k: int) -> DataFrame:
    """Top-K users by *average* preference over the chosen entities (the
    paper keeps the K users with highest average similarity)."""
    avg = scores.groupBy("user_id").agg(F.avg("score").alias("avg_score"))
    return avg.orderBy(F.desc("avg_score"), F.asc("user_id")).limit(k)
