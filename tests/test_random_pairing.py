"""Random pairing primitive tests: uniformity, counters, membership."""
import numpy as np
import pytest

from repro.baselines.random_pairing import RandomPairing


def test_fills_up_to_capacity():
    rp = RandomPairing(5, seed=0)
    for i in range(5):
        d, ev = rp.on_insert((i, i + 100))
        assert d == "add" and ev is None
    assert len(rp) == 5


def test_capacity_validation():
    with pytest.raises(ValueError):
        RandomPairing(0)


def test_membership_and_eviction():
    rp = RandomPairing(3, seed=1)
    for i in range(10):
        rp.on_insert((i, i + 100))
    assert len(rp) == 3
    for k in list(rp._keys):
        assert k in rp


def test_deletion_counters():
    rp = RandomPairing(3, seed=2)
    for i in range(3):
        rp.on_insert((i, i + 100))
    was = rp.on_delete((0, 100))
    assert was and rp.d1 == 1 and rp.d2 == 0
    was = rp.on_delete((9, 109))  # never sampled (not even inserted — counts as unsampled)
    assert not was and rp.d2 == 1
    assert rp.n_alive == 1


def test_compensation_consumes_counters():
    rng_hits = {"add": 0, "skip": 0}
    rp = RandomPairing(3, seed=3)
    for i in range(3):
        rp.on_insert((i, i + 100))
    rp.on_delete((0, 100))  # d1 = 1
    d, _ = rp.on_insert((50, 150))  # must compensate: d1/(d1+d2) = 1
    assert d == "add"
    assert rp.d1 == 0 and rp.d2 == 0


def test_population_accounting():
    rp = RandomPairing(3, seed=4)
    for i in range(6):
        rp.on_insert((i, i + 100))
    assert rp.n_alive == 6
    rp.on_delete((0, 100)) if (0, 100) in rp else rp.on_delete((1, 101))
    assert rp.population == 6  # alive 5 + 1 uncompensated


def test_inclusion_prob_bounds():
    rp = RandomPairing(10, seed=5)
    for i in range(4):
        rp.on_insert((i, i + 100))
    assert rp.inclusion_prob(2) == 1.0  # population below capacity
    for i in range(4, 40):
        rp.on_insert((i, i + 100))
    p = rp.inclusion_prob(2)
    assert 0 < p < 1
    assert rp.inclusion_prob(3) < p


def test_uniform_inclusion_probability():
    """Each alive item is sampled with (near-)equal probability, including
    through deletions — the defining RP property."""
    n_items, M, runs = 30, 10, 3000
    counts = np.zeros(n_items)
    for r in range(runs):
        rp = RandomPairing(M, seed=r)
        for i in range(20):
            rp.on_insert((i, i + 100))
        # delete five early items, insert ten more
        for i in range(5):
            rp.on_delete((i, i + 100))
        for i in range(20, n_items):
            rp.on_insert((i, i + 100))
        for i in range(5, n_items):
            if (i, i + 100) in rp:
                counts[i] += 1
    probs = counts[5:] / runs
    # all alive items should have the same inclusion probability
    assert probs.std() < 0.03, f"inclusion probs not uniform: {probs}"
    expected = len(rp) and M / rp.population
    assert abs(probs.mean() - M / 25) < 0.05


def test_swap_remove_consistency():
    rp = RandomPairing(50, seed=6)
    rng = np.random.default_rng(7)
    alive = set()
    for step in range(2000):
        if alive and rng.random() < 0.4:
            key = list(alive)[int(rng.integers(0, len(alive)))]
            alive.remove(key)
            rp.on_delete(key)
        else:
            key = (step, step + 10**6)
            alive.add(key)
            rp.on_insert(key)
        assert len(rp._keys) == len(rp._pos) <= 50
        for k in rp._keys:
            assert rp._keys[rp._pos[k]] == k
    assert set(rp._keys) <= alive
