"""Shared fixtures: a small deterministic world + its behavior log."""
import pytest

from repro.world import WorldConfig, build_world, generate_behaviors_pdf

SMALL = WorldConfig(
    n_entities=200,
    n_topics=10,
    n_super=4,
    n_users=80,
    weeks=2,
    events_per_user_week=25,
    seed=7,
)


@pytest.fixture(scope="session")
def world():
    return build_world(SMALL)


@pytest.fixture(scope="session")
def behaviors_pdf(world):
    return generate_behaviors_pdf(world)


@pytest.fixture(scope="session")
def behaviors_sdf(spark, world):
    from repro.world import generate_behaviors

    return generate_behaviors(spark, world).cache()
