"""Benchmark for Table 2 / Fig. 4: per-query ANN search latency (AQT) of
every method on the benchmark corpus. ``jobs/table2.py`` regenerates the
full quality table at all scales; this benchmark pins down the latency
rows under pytest-benchmark statistics."""
import pytest

from repro.bench.harness import METHODS, build_method

K = 100


@pytest.fixture(scope="module")
def built_indexes(bench_corpus):
    """Build each method once for the whole module."""
    cache = {}

    def get(name):
        if name not in cache:
            cache[name], _ = build_method(name, bench_corpus.emb)
        return cache[name]

    return get


@pytest.mark.parametrize(
    "method",
    ["Flat", "PQ", "OPQ", "PCA-PQ", "IVFPQ", "IVFPQ-HNSW", "FALCONN", "SK-LSH", "LIDER"],
)
def test_search_aqt(benchmark, built_indexes, bench_query_cycle, method):
    idx = built_indexes(method)
    queries = bench_query_cycle()

    def run():
        return idx.search(next(queries), K)

    out = benchmark(run)
    assert len(out) > 0
