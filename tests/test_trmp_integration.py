"""End-to-end integration test of the offline TRMP pipeline (Table I path).

Runs the full weekly loop on the small world with a reduced training budget
and checks the Table-I *shape*: stage ordering on ACC/CorS, AEEC shrinking
through the ranking stage, and all four rows populated.
"""
import numpy as np
import pytest

from repro.baselines.common import TrainConfig
from repro.core.trmp import run_trmp


@pytest.fixture(scope="module")
def report(spark, world, behaviors_sdf):
    return run_trmp(
        behaviors_sdf,
        world,
        cfg=TrainConfig(epochs=40, seed=0),
        dim=16,
        k_semantic=6,
        max_snapshots=3,
    )


def test_all_rows_present(report):
    assert set(report.rows) == {
        "TRMP w.o. E&R_s",
        "TRMP w.o. E&R",
        "TRMP w.o. E",
        "TRMP",
    }
    for row in report.rows.values():
        assert len(row.weekly_acc) == report.weeks


def test_stage_ordering_acc(report):
    """Paper's key claim: ACC(TRMP) ~ ACC(w.o. E) > ACC(w.o. E&R) > ACC(pop)."""
    r = report.rows
    assert r["TRMP w.o. E&R"].acc > r["TRMP w.o. E&R_s"].acc
    assert r["TRMP w.o. E"].acc > r["TRMP w.o. E&R"].acc
    assert r["TRMP"].acc > r["TRMP w.o. E&R"].acc


def test_stage_ordering_cors(report):
    r = report.rows
    assert r["TRMP w.o. E"].cors > r["TRMP w.o. E&R"].cors > r["TRMP w.o. E&R_s"].cors


def test_ranking_reduces_aeec(report):
    """Ranking filters relations, so AEEC must shrink vs the candidate stage."""
    r = report.rows
    assert r["TRMP w.o. E"].aeec < r["TRMP w.o. E&R"].aeec
    assert r["TRMP"].aeec < r["TRMP w.o. E&R"].aeec


def test_ranked_acc_reaches_high_regime(report):
    """At this tiny test scale the weekly models see very little data, so
    the regime bound is loose; the bench-scale Table I (EXPERIMENTS.md) is
    where the paper's 97%+ regime is reproduced."""
    assert report.rows["TRMP w.o. E"].acc > 74.0
    assert report.rows["TRMP"].acc > 74.0
    assert report.rows["TRMP"].acc > report.rows["TRMP w.o. E&R"].acc + 5.0


def test_final_artifacts(report, world):
    assert len(report.final_relations) > 0
    assert report.entity_embeddings.shape[0] == world.config.n_entities
    assert np.isfinite(report.entity_embeddings).all()
    assert report.final_relations["src"].max() < world.config.n_entities
