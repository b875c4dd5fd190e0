"""TRMP — the Three-stage Relation Mining Procedure, orchestrated weekly.

Reproduces the offline pipeline of Fig. 2/4 end to end and produces every
number of Table I:

for each weekly snapshot of the (drifting) behavior log:
  1. entity sequence extractor (Spark NER + sequence aggregation);
  2. Stage I candidate generation (Spark co-occurrence + semantic);
  3. Stage II ranking: ALPC trained on that week's Dataset-M, deciding which
     candidate relations survive;
  4. Stage III ensemble: multi-head attention over the last ≤T weekly ALPC
     embedding snapshots, re-deciding the relation set;

and the Table-I variants:
  * ``TRMP w.o. E&R_s`` — popularity-sampled pairs from the Entity Dict;
  * ``TRMP w.o. E&R``  — Stage-I candidate relations as-is;
  * ``TRMP w.o. E``    — ALPC-ranked relations (per-week model);
  * ``TRMP``           — ensemble-ranked relations.

ACC / CorS come from the simulated annotator panel, AEEC from relation
counts, and Var(ACC) is the variance of weekly ACC percentages — the
stability metric the ensemble stage exists to improve.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.baselines.common import TrainConfig
from repro.core.alpc import ALPC
from repro.core.candidate_generation import generate_candidates, popularity_pairs
from repro.core.ensemble import EnsembleModel, ensemble_decide, train_ensemble
from repro.eval.datasets import build_dataset_m
from repro.eval.metrics import aeec, relation_acc_cors
from repro.nlp.ner import entity_sequences, extract_entities
from repro.world.entity_dict import EntityWorld


@dataclass
class StageMetrics:
    """Aggregated Table-I row: mean ACC/CorS over weeks, AEEC, Var(ACC%)."""

    acc: float
    cors: float
    aeec: float
    var_acc: float
    weekly_acc: list[float] = field(default_factory=list)


@dataclass
class TRMPReport:
    """Everything Table I needs plus the artifacts the online stage uses."""

    rows: dict[str, StageMetrics]
    final_relations: pd.DataFrame  # (src, dst) ensemble-kept, final week
    entity_embeddings: np.ndarray  # h_e from the final ensemble (n, T*d)
    weeks: int


def _stage_row(
    world: EntityWorld,
    weekly_pairs: list[tuple[np.ndarray, np.ndarray]],
    seed: int,
) -> StageMetrics:
    accs, corss, aeecs = [], [], []
    for w, (src, dst) in enumerate(weekly_pairs):
        acc, cors = relation_acc_cors(world, src, dst, seed=seed + w)
        accs.append(acc * 100.0)
        corss.append(cors)
        aeecs.append(aeec(2 * len(src), world.config.n_entities))
    return StageMetrics(
        acc=float(np.mean(accs)) if accs else 0.0,
        cors=float(np.mean(corss)) if corss else 0.0,
        aeec=float(np.mean(aeecs)) if aeecs else 0.0,
        var_acc=float(np.var(accs)) if len(accs) > 1 else 0.0,
        weekly_acc=accs,
    )


def run_trmp(
    behaviors: DataFrame,
    world: EntityWorld,
    cfg: TrainConfig | None = None,
    dim: int = 32,
    k_semantic: int = 6,
    max_snapshots: int = 4,
    ner_p_miss: float = 0.12,
    ner_p_confuse: float = 0.06,
) -> TRMPReport:
    """Run the full weekly TRMP loop over all weeks in ``behaviors``."""
    cfg = cfg or TrainConfig()
    weeks = world.config.weeks
    # Upstream data-source fluctuation (the instability the ensemble stage
    # exists for, Fig. 5b): the extractor's effective quality varies week to
    # week, deterministically in the seed.
    drift_rng = np.random.default_rng(world.config.seed + cfg.seed + 777)
    week_miss = ner_p_miss * drift_rng.uniform(0.4, 2.2, size=weeks)
    week_confuse = ner_p_confuse * drift_rng.uniform(0.4, 2.2, size=weeks)

    weekly_cand: list[tuple[np.ndarray, np.ndarray]] = []
    weekly_rank: list[tuple[np.ndarray, np.ndarray]] = []
    weekly_ens: list[tuple[np.ndarray, np.ndarray]] = []
    weekly_pop: list[tuple[np.ndarray, np.ndarray]] = []
    snapshots: list[np.ndarray] = []
    final_relations = pd.DataFrame({"src": [], "dst": []})
    h_e = np.zeros((world.config.n_entities, dim))
    ens_model: EnsembleModel | None = None

    for week in range(weeks):
        mentions_w = extract_entities(
            behaviors.filter(F.col("week") == week),
            world.name_of,
            world.popularity,
            p_miss=float(week_miss[week]),
            p_confuse=float(week_confuse[week]),
            seed=week,
        )
        seqs_w = entity_sequences(mentions_w)
        cand = generate_candidates(seqs_w, world, dim=dim, k_semantic=k_semantic)
        src = cand.edges["src"].to_numpy()
        dst = cand.edges["dst"].to_numpy()
        weekly_cand.append((src, dst))

        # popularity-sampling variant, same relation budget as Stage I
        pp = popularity_pairs(world, len(src), seed=cfg.seed + 97 * week)
        weekly_pop.append((pp["src"].to_numpy(), pp["dst"].to_numpy()))

        # Stage II: weekly ALPC on that week's Dataset-M (global entity ids)
        ds = build_dataset_m(cand, world, seed=cfg.seed + week, relabel=False)
        alpc = ALPC(
            ds.features.shape[1],
            TrainConfig(
                epochs=cfg.epochs, lr=cfg.lr, hidden=cfg.hidden, seed=cfg.seed + week
            ),
        ).fit(ds)
        keep_rank = alpc.decide_pairs(src, dst)
        weekly_rank.append((src[keep_rank], dst[keep_rank]))
        snapshots.append(alpc.embeddings())

        # Stage III: ensemble over the last <= max_snapshots weekly models
        window = snapshots[-max_snapshots:]
        ens_model, h_e = train_ensemble(window, ds, cfg)
        keep_ens = ensemble_decide(ens_model, window, src, dst)
        weekly_ens.append((src[keep_ens], dst[keep_ens]))
        final_relations = pd.DataFrame({"src": src[keep_ens], "dst": dst[keep_ens]})

    rows = {
        "TRMP w.o. E&R_s": _stage_row(world, weekly_pop, seed=11),
        "TRMP w.o. E&R": _stage_row(world, weekly_cand, seed=22),
        "TRMP w.o. E": _stage_row(world, weekly_rank, seed=33),
        "TRMP": _stage_row(world, weekly_ens, seed=44),
    }
    return TRMPReport(
        rows=rows,
        final_relations=final_relations,
        entity_embeddings=h_e,
        weeks=weeks,
    )
