"""Evaluation utilities: effectiveness metrics, repetition harness, and
markdown emitters for the paper's tables."""
from repro.eval.metrics import Effectiveness, effectiveness  # noqa: F401
