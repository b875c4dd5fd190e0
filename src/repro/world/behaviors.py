"""Synthetic user behavior logs — substitute for Alipay search/visit logs.

Each user owns a sparse preference distribution over topics. A behavior event
is a short text snippet ("search"/"visit") mentioning 1–3 entities drawn from
the user's preferred topics, padded with filler words. Events are timestamped
over a rolling 30-day window per week.

Week-over-week **drift** (the instability that motivates the paper's ensemble
stage) is simulated by a per-week multiplicative random walk on topic
popularity plus per-week re-noising of entity popularity within topics.

Output is a Spark DataFrame ``(user_id, week, ts, channel, text)`` — exactly
the shape the entity-sequence extractor consumes.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.world.entity_dict import EntityWorld

_FILLERS = [
    "the", "for", "best", "near", "me", "buy", "cheap", "new", "top",
    "how", "to", "get", "info", "about", "latest", "deal", "open",
]


def topic_cohorts(world: EntityWorld) -> list[np.ndarray]:
    """Behavioral cohorts: small topic bundles users co-consume.

    Cohort membership is drawn WITHOUT regard to semantic structure — it
    models population-level confounding ("people who book trains also buy
    lipstick"), the reason co-occurrence alone over-generates relations.
    Entities of cohort-mate topics co-occur densely in the logs yet are
    semantically unrelated, so candidate noise forms *blocks* rather than
    isolated edges — exactly the failure mode that defeats structure-only
    link predictors and motivates the feature/semantic signals in ALPC.
    """
    cfg = world.config
    rng = np.random.default_rng(cfg.seed + 99)
    n_cohorts = max(4, cfg.n_topics // 3)
    return [
        rng.choice(cfg.n_topics, size=3, replace=False) for _ in range(n_cohorts)
    ]


def user_preferences(world: EntityWorld) -> np.ndarray:
    """(n_users, n_topics) sparse preference weights, rows sum to 1.

    70% of users follow a behavioral cohort (see :func:`topic_cohorts`) plus
    one personal topic; the rest pick topics independently.
    """
    cfg = world.config
    rng = np.random.default_rng(cfg.seed + 101)
    cohorts = topic_cohorts(world)
    prefs = np.zeros((cfg.n_users, cfg.n_topics))
    for u in range(cfg.n_users):
        if rng.random() < 0.7:
            base = cohorts[rng.integers(len(cohorts))]
            extra = rng.choice(cfg.n_topics)
            topics = np.unique(np.append(base, extra))
        else:
            k = rng.integers(2, 5)
            topics = rng.choice(cfg.n_topics, size=k, replace=False)
        w = rng.dirichlet(np.ones(len(topics)) * 0.8)
        prefs[u, topics] = w
    return prefs


def week_topic_drift(world: EntityWorld) -> np.ndarray:
    """(weeks, n_topics) multiplicative drift factors (random walk, mean ~1)."""
    cfg = world.config
    rng = np.random.default_rng(cfg.seed + 202)
    steps = rng.normal(0.0, 0.25, size=(cfg.weeks, cfg.n_topics))
    walk = np.exp(np.cumsum(steps, axis=0))
    return walk / walk.mean(axis=1, keepdims=True)


def week_volume_factors(world: EntityWorld) -> np.ndarray:
    """(weeks,) multiplicative log-volume factors — upstream data sources
    deliver substantially more or less data in some weeks (the fluctuation
    that destabilizes the weekly ranking model, paper Fig. 5b)."""
    cfg = world.config
    rng = np.random.default_rng(cfg.seed + 404)
    # clipped so a bad week thins the data substantially without starving
    # tiny test-scale worlds entirely
    return np.clip(np.exp(rng.normal(0.0, 0.55, size=cfg.weeks)), 0.45, 2.2)


def generate_behaviors_pdf(world: EntityWorld) -> pd.DataFrame:
    """Generate the full multi-week behavior log as pandas (seed-determined)."""
    cfg = world.config
    rng = np.random.default_rng(cfg.seed + 303)
    prefs = user_preferences(world)
    drift = week_topic_drift(world)

    # Pre-bucket entities by topic with within-topic popularity.
    by_topic: list[np.ndarray] = []
    by_topic_p: list[np.ndarray] = []
    for t in range(cfg.n_topics):
        idx = np.where(world.topic_of == t)[0]
        p = world.popularity[idx]
        by_topic.append(idx)
        by_topic_p.append(p / p.sum() if p.sum() > 0 else None)

    rows_user, rows_week, rows_ts, rows_chan, rows_text = [], [], [], [], []
    base_ts = pd.Timestamp("2022-06-06")
    volume = week_volume_factors(world)
    for week in range(cfg.weeks):
        # drifted per-user topic distribution this week
        wk_pref = prefs * drift[week][None, :]
        wk_pref /= wk_pref.sum(axis=1, keepdims=True)
        # per-week within-topic popularity re-noising (data-source fluctuation)
        wk_topic_p = []
        for t in range(cfg.n_topics):
            if by_topic_p[t] is None or len(by_topic[t]) == 0:
                wk_topic_p.append(None)
                continue
            noisy = by_topic_p[t] * np.exp(rng.normal(0, 0.4, len(by_topic[t])))
            wk_topic_p.append(noisy / noisy.sum())
        for u in range(cfg.n_users):
            n_ev = rng.poisson(cfg.events_per_user_week * volume[week])
            if n_ev == 0:
                continue
            ev_topics = rng.choice(cfg.n_topics, size=n_ev, p=wk_pref[u])
            offsets = np.sort(rng.integers(0, 7 * 24 * 3600, n_ev))
            for topic, off in zip(ev_topics, offsets):
                pool, pp = by_topic[topic], wk_topic_p[topic]
                if pool is None or len(pool) == 0:
                    continue
                n_mention = rng.integers(1, 4)
                ents = rng.choice(pool, size=min(n_mention, len(pool)), p=pp)
                words: list[str] = []
                for e in ents:
                    if rng.random() < 0.5:
                        words.append(str(rng.choice(_FILLERS)))
                    words.append(world.name_of[int(e)])
                if rng.random() < 0.5:
                    words.append(str(rng.choice(_FILLERS)))
                rows_user.append(u)
                rows_week.append(week)
                rows_ts.append(base_ts + pd.Timedelta(weeks=week, seconds=int(off)))
                rows_chan.append("search" if rng.random() < 0.6 else "visit")
                rows_text.append(" ".join(words))
    return pd.DataFrame(
        {
            "user_id": np.array(rows_user, dtype=np.int64),
            "week": np.array(rows_week, dtype=np.int64),
            "ts": rows_ts,
            "channel": rows_chan,
            "text": rows_text,
        }
    )


def generate_behaviors(spark: SparkSession, world: EntityWorld) -> DataFrame:
    """Spark DataFrame of the behavior log (repartitioned for parallelism)."""
    pdf = generate_behaviors_pdf(world)
    return spark.createDataFrame(pdf).repartition(16, "user_id")
