"""Synthetic dense-embedding corpora and query workloads.

Substitutes the paper's MS MARCO / Wiki-21M embedding collections (see
DESIGN.md §2 for the substitution rationale).
"""
from repro.embeddings.corpus import EmbeddingCorpus, QuerySet, make_corpus, make_queries  # noqa: F401
from repro.embeddings.datasets import DATASETS, DatasetSpec, load_dataset  # noqa: F401
