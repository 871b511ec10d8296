"""Benchmark fixtures: mid-scale corpora (the SF≈0.1 equivalent for this
paper's workload) shared across the per-table benchmark modules."""
import numpy as np
import pytest

from repro.embeddings.corpus import exact_topk
from repro.embeddings.datasets import dev_queries, load_dataset


@pytest.fixture(scope="session")
def bench_corpus():
    """MSL-30k: large enough that index structure matters, small enough
    that all nine methods build within the benchmark session."""
    return load_dataset("MSL-30k")


@pytest.fixture(scope="session")
def bench_queries(bench_corpus):
    return dev_queries(bench_corpus, 100)


@pytest.fixture(scope="session")
def bench_query_cycle(bench_queries):
    """Endless query iterator so benchmark rounds see varied queries."""
    def make():
        i = 0
        n = bench_queries.n
        while True:
            yield bench_queries.emb[i % n]
            i += 1
    return make
