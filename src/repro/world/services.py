"""Synthetic services and the online conversion simulator.

The paper's Table III runs online A/B tests for five services (Railway,
Dicos, Cosmetics, Dessert, Women Football) with no seed users. Here each
service is anchored to a latent topic of the world and described by a few
query phrases (entity names from that topic) — exactly what a marketer types
into the EGL console.

Conversions are simulated per exposed user with a logistic model over the
user's *true* affinity to the service topic (plus noise), so a targeting
method that finds genuinely interested users earns a higher CVR. The
simulator is shared by the EGL arm and the rule-based baseline arm, making
the comparison fair.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.world.behaviors import user_preferences
from repro.world.entity_dict import EntityWorld

SERVICE_NAMES = ["Railway", "Dicos", "Cosmetics", "Dessert", "Women Football"]


@dataclass(frozen=True)
class Service:
    name: str
    topic: int
    query_entities: tuple[int, ...]  # entity ids the marketer would type


def make_services(world: EntityWorld, n_queries: int = 2) -> list[Service]:
    """Anchor the 5 services to distinct topics; pick popular query entities."""
    cfg = world.config
    rng = np.random.default_rng(cfg.seed + 404)
    topics = rng.choice(cfg.n_topics, size=len(SERVICE_NAMES), replace=False)
    services = []
    for name, t in zip(SERVICE_NAMES, topics):
        members = np.where(world.topic_of == t)[0]
        pop = world.popularity[members]
        order = members[np.argsort(-pop)]
        services.append(Service(name, int(t), tuple(int(e) for e in order[:n_queries])))
    return services


def user_topic_affinity(world: EntityWorld, topic: int) -> np.ndarray:
    """(n_users,) true interest of each user in ``topic``.

    Blends the user's preference mass on the topic itself with mass on
    latently-similar topics (cosine of topic centers), so users interested
    in sibling topics are partially interested too — the mechanism that
    rewards k-hop expansion beyond the literal service tag.
    """
    prefs = user_preferences(world)  # (U, T)
    sim = world.topic_centers @ world.topic_centers[topic]
    sim = np.clip(sim, 0.0, None)
    return prefs @ sim


def simulate_conversions(
    world: EntityWorld,
    service: Service,
    exposed_users: np.ndarray,
    seed: int = 0,
    base_rate: float = -2.2,
    gain: float = 5.0,
) -> np.ndarray:
    """Bernoulli conversion per exposed user: sigmoid(base + gain*affinity)."""
    exposed_users = np.asarray(exposed_users, dtype=np.int64)
    rng = np.random.default_rng(world.config.seed * 31 + seed + service.topic)
    affinity = user_topic_affinity(world, service.topic)[exposed_users]
    p = 1.0 / (1.0 + np.exp(-(base_rate + gain * affinity)))
    return rng.random(len(exposed_users)) < p
