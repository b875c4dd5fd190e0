"""Experiment harnesses that regenerate the paper's Tables I–III.

Each ``table*`` function runs the full pipeline at the requested world scale
and returns a pandas DataFrame with the same rows/columns the paper reports,
so ``jobs/`` entrypoints and ``benchmarks/`` share one implementation.

Scales:

* ``TEST_WORLD``  — tiny world for unit/integration tests (seconds);
* ``BENCH_WORLD`` — the EXPERIMENTS.md scale (~1:75 of the paper's datasets).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.common import TrainConfig
from repro.baselines.registry import METHODS, run_method
from repro.core.candidate_generation import generate_candidates
from repro.core.online import ab_test
from repro.core.preference import user_embeddings
from repro.core.trmp import run_trmp
from repro.eval.datasets import build_dataset_m, sample_subdataset
from repro.graphstore import GeaStore
from repro.nlp.ner import entity_sequences, extract_entities
from repro.world import WorldConfig, build_world, generate_behaviors, make_services

TEST_WORLD = WorldConfig(
    n_entities=200, n_topics=10, n_super=4, n_users=80, weeks=2,
    events_per_user_week=25, seed=7,
)

# ~1:75 of the paper's Dataset A (113k entities) per sub-dataset; 6 weekly
# snapshots as in Fig. 5b's weekly accuracy trend.
BENCH_WORLD = WorldConfig(
    n_entities=1000, n_topics=24, n_super=6, n_users=600, weeks=6,
    events_per_user_week=50, seed=11,
)


# ------------------------------------------------------------------ Table I
def table1(spark: SparkSession, world_cfg: WorldConfig | None = None,
           cfg: TrainConfig | None = None) -> pd.DataFrame:
    """Table I — metrics of each TRMP stage (ACC, CorS, AEEC, Var ACC)."""
    wc = world_cfg or BENCH_WORLD
    world = build_world(wc)
    behaviors = generate_behaviors(spark, world)
    rep = run_trmp(behaviors, world, cfg=cfg or TrainConfig(), max_snapshots=4)
    rows = []
    for stage in ["TRMP w.o. E&R_s", "TRMP w.o. E&R", "TRMP w.o. E", "TRMP"]:
        r = rep.rows[stage]
        rows.append(
            {
                "Stage": stage,
                "ACC": f"{r.acc:.2f}%",
                "CorS": round(r.cors, 3),
                "AEEC": round(r.aeec, 1),
                "Variance of ACC": round(r.var_acc, 2),
            }
        )
    return pd.DataFrame(rows)


# ----------------------------------------------------------------- Table II
SUBDATASETS = {"A": (0.85, 1), "B": (0.40, 2), "C": (0.70, 3)}  # ratio, seed


def table2(
    spark: SparkSession,
    world_cfg: WorldConfig | None = None,
    cfg: TrainConfig | None = None,
    methods: list[str] | None = None,
) -> pd.DataFrame:
    """Table II — AUC/ACC of all methods on sub-datasets A, B, C."""
    wc = world_cfg or BENCH_WORLD
    cfg = cfg or TrainConfig()
    world = build_world(wc)
    behaviors = generate_behaviors(spark, world)
    mentions = extract_entities(behaviors, world.name_of, world.popularity)
    sequences = entity_sequences(mentions).cache()
    cand = generate_candidates(sequences, world)
    ds_m = build_dataset_m(cand, world, seed=cfg.seed)
    subs = {
        name: sample_subdataset(ds_m, ratio, seed=seed)
        for name, (ratio, seed) in SUBDATASETS.items()
    }
    rows = []
    for method in methods or METHODS:
        row: dict = {"Method": method}
        for name, sub in subs.items():
            res = run_method(method, sub, cfg)
            row[f"AUC_{name}"] = round(res.auc, 3)
            row[f"ACC_{name}"] = round(res.acc, 3)
        rows.append(row)
    meta = pd.DataFrame(
        [
            {
                "Method": "#Entities/#Edges",
                **{f"AUC_{k}": subs[k].n for k in subs},
                **{f"ACC_{k}": subs[k].graph.m for k in subs},
            }
        ]
    )
    return pd.concat([meta, pd.DataFrame(rows)], ignore_index=True)


# ---------------------------------------------------------------- Table III
def table3(
    spark: SparkSession,
    world_cfg: WorldConfig | None = None,
    cfg: TrainConfig | None = None,
    store_path: str | None = None,
    top_k: int = 150,
) -> pd.DataFrame:
    """Table III — online A/B test per service (Δexposure, conversions, CVR,
    running time), EGL (graph reasoning + preference) vs rule-based arm.

    Runs the offline TRMP pipeline first (the online stage serves its
    artifacts), then both targeting arms per service with simulated
    conversions.
    """
    import tempfile

    wc = world_cfg or BENCH_WORLD
    cfg = cfg or TrainConfig()
    world = build_world(wc)
    behaviors = generate_behaviors(spark, world)
    rep = run_trmp(behaviors, world, cfg=cfg, max_snapshots=4)

    store = GeaStore(spark, store_path or tempfile.mkdtemp(prefix="geastore_"))
    store.put_relations(rep.final_relations)

    mentions = extract_entities(behaviors, world.name_of, world.popularity).cache()
    sequences = entity_sequences(mentions)
    users = user_embeddings(sequences, rep.entity_embeddings).cache()

    services = make_services(world)
    rows = ab_test(
        world, store, users, rep.entity_embeddings, mentions, services,
        k_hops=2, top_k=top_k, seed=cfg.seed,
    )
    return pd.DataFrame(
        [
            {
                "Services": r.service,
                "# exposure": f"{r.exposure_delta_pct:+.2f}%",
                "# conversion (EGL)": r.conversions_egl,
                "CVR (EGL)": f"{100 * r.cvr_egl:.2f}%",
                "CVR (rule)": f"{100 * r.cvr_rule:.2f}%",
                "Running Time": f"{r.running_time_s:.1f} s",
            }
            for r in rows
        ]
    )
