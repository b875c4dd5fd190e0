"""The paper's core: TRMP (candidate generation → ALPC ranking → ensemble),
user entity preference, and the online targeting stage."""
from repro.core.alpc import ALPC, GeniePathEncoder
from repro.core.candidate_generation import CandidateResult, generate_candidates
from repro.core.ensemble import EnsembleModel, train_ensemble
from repro.core.online import ab_test, egl_target_users, rule_based_target_users
from repro.core.preference import preference_scores, top_k_users, user_embeddings
from repro.core.trmp import TRMPReport, run_trmp

__all__ = [
    "ALPC",
    "GeniePathEncoder",
    "CandidateResult",
    "generate_candidates",
    "EnsembleModel",
    "train_ensemble",
    "run_trmp",
    "TRMPReport",
    "user_embeddings",
    "preference_scores",
    "top_k_users",
    "egl_target_users",
    "rule_based_target_users",
    "ab_test",
]
