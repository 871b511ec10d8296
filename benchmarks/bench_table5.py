"""Benchmark for Table 5: index construction cost — full LIDER build
(all three stages) vs the original SK-LSH build, single-round pedantic
timings (builds are too heavy for statistical rounds)."""
import pytest

from repro.baselines.sklsh import SKLSHIndex
from repro.core.lider import LIDER, LIDERConfig


def test_lider_build(benchmark, bench_corpus):
    def build():
        return LIDER(LIDERConfig()).fit(bench_corpus.emb)

    idx = benchmark.pedantic(build, rounds=1, iterations=1)
    assert idx.memory_footprint() > 0


def test_sklsh_build(benchmark, bench_corpus):
    def build():
        return SKLSHIndex(h=24).fit(bench_corpus.emb)

    idx = benchmark.pedantic(build, rounds=1, iterations=1)
    assert idx.nbytes > 0


def test_lider_memory_saving_vs_sklsh(bench_corpus):
    """Not a timing: asserts the Table-5 memory claim (LIDER ≪ SK-LSH)."""
    lider = LIDER(LIDERConfig()).fit(bench_corpus.emb)
    sklsh = SKLSHIndex(h=24).fit(bench_corpus.emb)
    assert lider.memory_footprint() < 0.75 * sklsh.nbytes
