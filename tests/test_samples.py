"""Sample-set generation tests (protocol of Section VI-C, scaled)."""
import numpy as np

from repro.estimator import samples as S


def test_generate_and_cache(tmp_path, monkeypatch):
    monkeypatch.setattr(S, "_CACHE_DIR", tmp_path)
    smp = S.generate(4, n_range=(500, 1000), k_range=(4, 8), max_iter=3, seed=0)
    assert len(smp) == 4
    for s in smp:
        assert 500 <= s.n <= 1000
        assert 1 <= s.n_iter <= 3
        assert s.total_time > 0
        assert s.tree_stats is not None and len(s.tree_stats) == 8
    # second call hits the cache and returns identical data
    again = S.generate(4, n_range=(500, 1000), k_range=(4, 8), max_iter=3, seed=0)
    assert [a.iter_times for a in again] == [s.iter_times for s in smp]
    assert len(list(tmp_path.glob("samples_*.json"))) == 1


def test_generate_deterministic_configs(tmp_path, monkeypatch):
    monkeypatch.setattr(S, "_CACHE_DIR", tmp_path)
    a = S.generate(3, n_range=(500, 800), k_range=(4, 8), max_iter=2, seed=5, cache=False)
    b = S.generate(3, n_range=(500, 800), k_range=(4, 8), max_iter=2, seed=5, cache=False)
    assert [(s.n, s.k, s.f) for s in a] == [(s.n, s.k, s.f) for s in b]


def test_split_fractions():
    smp = [
        S.TaskSample(n=i, k=2, d=2, f=30, iter_times=[0.1], tree_stats=np.zeros(8))
        for i in range(100)
    ]
    tr, va, te = S.split(smp, seed=1)
    assert len(tr) == 80 and len(va) == 10 and len(te) == 10
    ids = sorted(s.n for s in tr + va + te)
    assert ids == list(range(100))  # a partition, nothing lost
