"""PySpark reproduction of the EGL System (ICDE 2023).

See DESIGN.md for the module map and EXPERIMENTS.md for paper-vs-measured
numbers. Subpackages: ``core`` (TRMP/ALPC/preference/online), ``world``
(synthetic Alipay substrate), ``nlp``, ``nn``, ``embed``, ``baselines``,
``graphstore``, ``eval``; ``experiments`` regenerates Tables I–III.
"""
