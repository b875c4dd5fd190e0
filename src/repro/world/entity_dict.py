"""Synthetic Entity Dict — substitute for Alipay's expert-curated dictionary.

The paper's Entity Dict holds millions of entities over 26 types. Here a
seed-deterministic generator produces a scaled-down dict with the structure
the rest of the system needs:

* every entity belongs to a latent **topic**; topics nest under
  **supertopics** (two-level hierarchy → the "NBA → James → Lakers" style
  hierarchical relatedness the online reasoning demo shows);
* every entity carries a latent **topic vector** (cluster center + noise) —
  the *ground truth* relatedness signal that, in the real system, lives in
  the world and is only observable through human annotators;
* entity **names** are multi-token strings whose leading token is shared
  within a topic and whose characters encode the supertopic, so a character
  n-gram "semantic" embedding (the BERT substitute) correlates with the
  latent structure without revealing it exactly;
* a zipf **popularity** rank drives behavior-log frequencies.

``true_affinity`` (cosine of topic vectors) is used ONLY by the annotator and
conversion simulators — never as a model feature.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

N_ENTITY_TYPES = 26
_CONSONANTS = list("bcdfghjklmnpqrstvwz")
_VOWELS = list("aeiou")


def _syllable(rng: np.random.Generator) -> str:
    return rng.choice(_CONSONANTS) + rng.choice(_VOWELS)


def _word(rng: np.random.Generator, n_syll: int) -> str:
    return "".join(_syllable(rng) for _ in range(n_syll))


@dataclass(frozen=True)
class WorldConfig:
    """Scale knobs for the synthetic world (all generators honour ``seed``)."""

    n_entities: int = 300
    n_topics: int = 12
    n_super: int = 4
    n_users: int = 150
    weeks: int = 3
    events_per_user_week: int = 40
    topic_dim: int = 16
    # Per-dimension noise stds. With unit-norm centers in d=16, a per-dim std
    # a gives ||noise||^2 ~= 16 a^2, so cosine(same cluster) ~= 1/(1+16 a^2):
    # entity_noise=0.10 -> same-topic affinity ~0.87 (annotators: correlated);
    # topic_noise=0.25 -> sibling-topic affinity ~0.45 (annotators: medium).
    entity_noise: float = 0.10
    topic_noise: float = 0.25
    seed: int = 7


@dataclass
class EntityWorld:
    """The generated world: dict + latent state shared by all simulators."""

    config: WorldConfig
    entities: pd.DataFrame  # entity_id, name, entity_type, topic, supertopic, popularity
    topic_of: np.ndarray  # (n_entities,) topic index
    vectors: np.ndarray  # (n_entities, topic_dim) latent topic vectors (unit norm)
    topic_centers: np.ndarray  # (n_topics, topic_dim)
    popularity: np.ndarray  # (n_entities,) sampling probability, sums to 1
    name_of: list[str] = field(default_factory=list)

    def true_affinity(self, u: np.ndarray, v: np.ndarray) -> np.ndarray:
        """Ground-truth relatedness = cosine of latent vectors (unit-norm)."""
        return np.einsum("ij,ij->i", self.vectors[u], self.vectors[v])

    def related(self, u: np.ndarray, v: np.ndarray, tau: float = 0.55) -> np.ndarray:
        return self.true_affinity(u, v) > tau


def build_world(config: WorldConfig | None = None) -> EntityWorld:
    """Generate the Entity Dict and latent world state deterministically."""
    cfg = config or WorldConfig()
    rng = np.random.default_rng(cfg.seed)

    # --- latent hierarchy: supertopic centers -> topic centers -> entities
    super_centers = rng.normal(size=(cfg.n_super, cfg.topic_dim))
    super_centers /= np.linalg.norm(super_centers, axis=1, keepdims=True)
    super_of_topic = np.arange(cfg.n_topics) % cfg.n_super
    topic_centers = super_centers[super_of_topic] + cfg.topic_noise * rng.normal(
        size=(cfg.n_topics, cfg.topic_dim)
    )
    topic_centers /= np.linalg.norm(topic_centers, axis=1, keepdims=True)

    topic_of = rng.integers(0, cfg.n_topics, cfg.n_entities)
    vectors = topic_centers[topic_of] + cfg.entity_noise * rng.normal(
        size=(cfg.n_entities, cfg.topic_dim)
    )
    vectors /= np.linalg.norm(vectors, axis=1, keepdims=True)

    # --- names: leading token shared per topic, supertopic-specific prefix
    # syllable so char n-grams correlate with the hierarchy; unique suffix.
    super_prefix = [_syllable(rng) for _ in range(cfg.n_super)]
    topic_token = [
        super_prefix[super_of_topic[t]] + _word(rng, 2) for t in range(cfg.n_topics)
    ]
    names: list[str] = []
    seen: set[str] = set()
    for i in range(cfg.n_entities):
        while True:
            name = f"{topic_token[topic_of[i]]} {_word(rng, 2)}"
            if name not in seen:
                seen.add(name)
                names.append(name)
                break

    # --- entity types: each topic maps to a small set of the 26 types
    types_per_topic = [
        rng.choice(N_ENTITY_TYPES, size=3, replace=False) for _ in range(cfg.n_topics)
    ]
    entity_type = np.array(
        [rng.choice(types_per_topic[topic_of[i]]) for i in range(cfg.n_entities)]
    )

    # --- zipf popularity over a random permutation of entities
    ranks = rng.permutation(cfg.n_entities) + 1
    pop = 1.0 / ranks**1.05
    pop /= pop.sum()

    entities = pd.DataFrame(
        {
            "entity_id": np.arange(cfg.n_entities),
            "name": names,
            "entity_type": [f"type_{t:02d}" for t in entity_type],
            "topic": topic_of,
            "supertopic": super_of_topic[topic_of],
            "popularity": pop,
        }
    )
    return EntityWorld(
        config=cfg,
        entities=entities,
        topic_of=topic_of,
        vectors=vectors,
        topic_centers=topic_centers,
        popularity=pop,
        name_of=names,
    )
