"""Micro-benchmarks of the core primitives backing every table."""
import numpy as np

from repro.core import patterns as pt
from repro.core.coverage import CoverageIndex
from repro.core.mup_index import MupIndex
from repro.enhance.hitting_set import build_inverted_indices, hit_count


def _index(d=12, n=50_000, seed=0):
    g = np.random.default_rng(seed)
    combos = g.integers(0, 2, size=(4000, d))
    counts = g.integers(1, 1 + n // 4000, size=4000)
    return CoverageIndex(combos, counts, [2] * d)


def test_bench_coverage_oracle(benchmark):
    idx = _index()
    pats = [tuple(g if i % 3 else pt.X for i, g in enumerate(row))
            for row in idx.combos[:200]]
    benchmark(lambda: [idx.cov(p) for p in pats])


def test_bench_mup_dominance(benchmark):
    g = np.random.default_rng(1)
    midx = MupIndex([2] * 12)
    for row in g.integers(-1, 2, size=(2000, 12)):
        midx.add(tuple(int(v) for v in row))
    probes = [tuple(int(v) for v in r) for r in g.integers(-1, 2, size=(200, 12))]
    benchmark(lambda: [midx.dominated_by_any(p) for p in probes])


def test_bench_hit_count(benchmark):
    g = np.random.default_rng(2)
    cards = [2] * 12
    pats = [tuple(int(v) for v in r) for r in g.integers(-1, 2, size=(3000, 12))]
    idx = build_inverted_indices(pats, cards)
    full = (1 << len(pats)) - 1
    benchmark(lambda: hit_count(full, idx, cards))
