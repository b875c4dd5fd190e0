"""Synthetic "Alipay world" substrate: entity dict, behavior logs with weekly
drift, simulated annotator panel, and services + conversion simulator.

This package replaces the proprietary data sources of the paper while
exposing a latent ground truth (topic vectors) that the annotator and
conversion simulators — but never the models — can observe.
"""
from repro.world.annotators import acc_and_cors, annotate_pairs
from repro.world.behaviors import generate_behaviors, generate_behaviors_pdf, user_preferences
from repro.world.entity_dict import EntityWorld, WorldConfig, build_world
from repro.world.services import Service, make_services, simulate_conversions

__all__ = [
    "EntityWorld",
    "WorldConfig",
    "build_world",
    "generate_behaviors",
    "generate_behaviors_pdf",
    "user_preferences",
    "annotate_pairs",
    "acc_and_cors",
    "Service",
    "make_services",
    "simulate_conversions",
]
