"""Tests for the user entity preference module (Eq. 7) with oracle checks."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.preference import preference_scores, top_k_users, user_embeddings
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def tiny_inputs(spark):
    seqs = spark.createDataFrame(
        pd.DataFrame(
            {
                "user_id": [0, 0, 1, 2],
                "week": [0, 1, 0, 0],
                "entity_seq": [[0, 1], [1, 2], [2], [0, 0, 3]],
            }
        )
    )
    rng = np.random.default_rng(0)
    h_e = rng.normal(size=(4, 3)).round(3)
    return seqs, h_e


def test_user_embeddings_mean(spark, tiny_inputs):
    seqs, h_e = tiny_inputs
    got = user_embeddings(seqs, h_e).toPandas().set_index("user_id").sort_index()
    # user 0: mean of h_e[0], h_e[1], h_e[1], h_e[2]
    exp0 = h_e[[0, 1, 1, 2]].mean(axis=0)
    np.testing.assert_allclose(np.array(got.loc[0, "r"]), exp0, rtol=1e-9)
    # user 2: duplicates count twice
    exp2 = h_e[[0, 0, 3]].mean(axis=0)
    np.testing.assert_allclose(np.array(got.loc[2, "r"]), exp2, rtol=1e-9)


def test_user_embeddings_against_oracle(spark, tiny_inputs):
    """The Spark aggregation equals a DuckDB SQL over exploded embeddings."""
    seqs, h_e = tiny_inputs
    users = user_embeddings(seqs, h_e)
    flat = users.select(
        "user_id", F.posexplode("r").alias("dim", "val")
    )
    emb_table = pd.DataFrame(
        {
            "entity_id": np.repeat(np.arange(h_e.shape[0]), h_e.shape[1]),
            "dim": np.tile(np.arange(h_e.shape[1]), h_e.shape[0]),
            "val": h_e.reshape(-1),
        }
    )
    mentions = seqs.select("user_id", F.explode("entity_seq").alias("entity_id"))
    assert_equivalent(
        flat,
        """
        SELECT m.user_id, e.dim::INTEGER AS dim, AVG(e.val) AS val
        FROM mentions m JOIN emb e ON m.entity_id = e.entity_id
        GROUP BY 1, 2
        """,
        mentions=mentions,
        emb=emb_table,
    )


def test_preference_scores_dot_product(spark, tiny_inputs):
    seqs, h_e = tiny_inputs
    users = user_embeddings(seqs, h_e)
    scores = preference_scores(users, np.array([1, 3]), h_e).toPandas()
    assert len(scores) == 3 * 2  # 3 users x 2 entities
    r0 = h_e[[0, 1, 1, 2]].mean(axis=0)
    got = scores[(scores.user_id == 0) & (scores.entity_id == 1)]["score"].iloc[0]
    np.testing.assert_allclose(got, r0 @ h_e[1], rtol=1e-9)


def test_preference_scores_against_oracle(spark, tiny_inputs):
    seqs, h_e = tiny_inputs
    users = user_embeddings(seqs, h_e)
    scores = preference_scores(users, np.array([0, 2]), h_e)
    flat_users = users.select("user_id", F.posexplode("r").alias("dim", "rv"))
    emb_table = pd.DataFrame(
        {
            "entity_id": np.repeat(np.arange(h_e.shape[0]), h_e.shape[1]),
            "dim": np.tile(np.arange(h_e.shape[1]), h_e.shape[0]),
            "val": h_e.reshape(-1),
        }
    )
    assert_equivalent(
        scores,
        """
        SELECT u.user_id, e.entity_id, SUM(u.rv * e.val) AS score
        FROM users u JOIN emb e ON u.dim = e.dim
        WHERE e.entity_id IN (0, 2)
        GROUP BY 1, 2
        """,
        users=flat_users,
        emb=emb_table,
    )


def test_top_k_users(spark, tiny_inputs):
    seqs, h_e = tiny_inputs
    users = user_embeddings(seqs, h_e)
    scores = preference_scores(users, np.array([0, 1, 2, 3]), h_e)
    top = top_k_users(scores, 2).toPandas()
    assert len(top) == 2
    # verify against explicit computation
    pdf = scores.toPandas().groupby("user_id")["score"].mean().sort_values(ascending=False)
    assert list(top["user_id"]) == list(pdf.index[:2])


def test_top_k_users_ties_deterministic(spark):
    scores = spark.createDataFrame(
        pd.DataFrame({"user_id": [5, 3, 9], "entity_id": [0, 0, 0], "score": [1.0, 1.0, 0.5]})
    )
    top = top_k_users(scores, 2).toPandas()
    assert list(top["user_id"]) == [3, 5]  # tie broken by user_id asc
