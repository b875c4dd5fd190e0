"""The online stage of the EGL System (Sec. II-B) + the Table-III A/B harness.

Online user-targeting path (what a marketer's request triggers):

1. the marketer supplies a few query phrases → entities (the service's
   anchor entities);
2. **entity graph reasoning**: k-hop expansion over the stored entity graph
   (GeaStore online index), depth controlled by the marketer;
3. the expanded entity set retrieves users via the pre-computed user entity
   preference module; the top-K users by average preference are exported.

The A/B harness compares this against the production baseline the paper
reports gains over — a **rule-based method** that targets users who
literally matched the service's tag (mentioned a query entity in their
logs) — and simulates conversions for both arms with the shared world
conversion model.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.preference import preference_scores, top_k_users
from repro.graphstore.geastore import GeaStore
from repro.world.entity_dict import EntityWorld
from repro.world.services import Service, simulate_conversions


@dataclass
class TargetingResult:
    service: str
    users: np.ndarray
    expanded_entities: np.ndarray
    running_time_s: float


def egl_target_users(
    store: GeaStore,
    users_emb: DataFrame,
    h_e: np.ndarray,
    service: Service,
    k_hops: int = 2,
    top_k: int = 300,
    max_entities: int = 60,
) -> TargetingResult:
    """The full online path, timed end-to-end (graph reasoning + retrieval)."""
    t0 = time.perf_counter()
    hops = store.k_hop_online(list(service.query_entities), k_hops)
    # Marketers SELECT the entities they require from the expansion (step 3
    # of the console flow, Sec. II-B): emulate that by ranking the k-hop
    # candidates by embedding similarity to the query entities and keeping
    # the closest ``max_entities`` (hop depth breaks ties).
    cand = np.fromiter(hops.keys(), dtype=np.int64)
    q = h_e[list(service.query_entities)].mean(axis=0)
    sim = h_e[cand] @ q / (
        np.linalg.norm(h_e[cand], axis=1) * np.linalg.norm(q) + 1e-12
    )
    order = np.lexsort((np.array([hops[int(e)] for e in cand]), -sim))
    chosen = cand[order[:max_entities]]
    scores = preference_scores(users_emb, chosen, h_e)
    top = top_k_users(scores, top_k).toPandas()
    dt = time.perf_counter() - t0
    return TargetingResult(
        service=service.name,
        users=top["user_id"].to_numpy(),
        expanded_entities=chosen,
        running_time_s=dt,
    )


def rule_based_target_users(
    mentions: DataFrame,
    service: Service,
    world: EntityWorld,
    top_k: int = 300,
) -> np.ndarray:
    """Production baseline: rule-based targeting with prefabricated tags
    (Fig. 1a — "tag mining and rule expression"). The marketer's rule
    selects users whose behavior matched the service's *tags* — the entity
    types of its query entities — which is coarser than entity-level
    matching: the tag buckets mix in entities from unrelated topics that
    happen to share a type."""
    types = world.entities["entity_type"].to_numpy()
    tag_set = {types[int(e)] for e in service.query_entities}
    tagged = [
        int(e)
        for e in world.entities["entity_id"].to_numpy()
        if types[int(e)] in tag_set
    ]
    hits = (
        mentions.filter(F.col("entity_id").isin(tagged))
        .groupBy("user_id")
        .agg(F.count(F.lit(1)).alias("cnt"))
        .orderBy(F.desc("cnt"), F.asc("user_id"))
        .limit(top_k)
        .toPandas()
    )
    return hits["user_id"].to_numpy()


@dataclass
class ABRow:
    """One Table-III row."""

    service: str
    exposure_delta_pct: float  # (#exposed_EGL - #exposed_rule) / #exposed_rule
    conversions_egl: int
    conversions_rule: int
    cvr_egl: float
    cvr_rule: float
    running_time_s: float


def ab_test(
    world: EntityWorld,
    store: GeaStore,
    users_emb: DataFrame,
    h_e: np.ndarray,
    mentions: DataFrame,
    services: list[Service],
    k_hops: int = 2,
    top_k: int = 300,
    seed: int = 0,
) -> list[ABRow]:
    """Run both arms for every service and simulate conversions."""
    rows = []
    for i, svc in enumerate(services):
        egl = egl_target_users(store, users_emb, h_e, svc, k_hops=k_hops, top_k=top_k)
        rule = rule_based_target_users(mentions, svc, world, top_k=top_k)
        conv_e = simulate_conversions(world, svc, egl.users, seed=seed + i).sum()
        conv_r = simulate_conversions(world, svc, rule, seed=seed + 100 + i).sum()
        exp_e, exp_r = len(egl.users), len(rule)
        rows.append(
            ABRow(
                service=svc.name,
                exposure_delta_pct=100.0 * (exp_e - exp_r) / max(1, exp_r),
                conversions_egl=int(conv_e),
                conversions_rule=int(conv_r),
                cvr_egl=conv_e / max(1, exp_e),
                cvr_rule=conv_r / max(1, exp_r),
                running_time_s=egl.running_time_s,
            )
        )
    return rows
