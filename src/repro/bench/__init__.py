"""Evaluation harness reproducing the paper's tables (§7)."""
from repro.bench.harness import LiderIndex, build_method, evaluate, METHODS  # noqa: F401
