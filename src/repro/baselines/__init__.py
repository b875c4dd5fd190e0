"""Link-prediction baselines of Table II and the shared training substrate.

``registry`` is exposed lazily: it imports ``repro.core.alpc`` (ALPC is one
of the Table-II methods), and ``core.alpc`` in turn imports
``baselines.common`` — an eager import here would close that cycle.
"""
from repro.baselines.common import EvalResult, TrainConfig, evaluate_model

__all__ = ["TrainConfig", "EvalResult", "evaluate_model", "METHODS", "run_method"]


def __getattr__(name: str):
    if name in ("METHODS", "run_method"):
        from repro.baselines import registry

        return getattr(registry, name)
    raise AttributeError(f"module {__name__!r} has no attribute {name!r}")
