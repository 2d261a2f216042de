"""DDPG agent tests: replay, actor/critic updates, targets."""
import numpy as np
import pytest

from repro.rl.ddpg import DDPG, ReplayBuffer
from repro.rl.policy import heuristic_init_params


def test_replay_push_and_wraparound():
    buf = ReplayBuffer(4, 3, np.random.default_rng(0))
    for i in range(6):
        buf.push(np.full(3, i), i, 0.1 * i, np.full(3, i + 1), False)
    assert buf.n == 4
    s, a, r, s2, d = buf.sample(8)
    assert s.shape == (8, 3) and a.shape == (8,)
    assert set(a.tolist()) <= {2.0, 3.0, 4.0, 5.0}


def test_replay_terminal_state_none():
    buf = ReplayBuffer(4, 3, np.random.default_rng(0))
    buf.push(np.ones(3), 1.0, 0.5, None, True)
    assert (buf.s2[0] == 0).all() and buf.done[0]


def test_act_positive_and_matches_batch():
    agent = DDPG(6, seed=1)
    s = np.random.default_rng(2).random(6)
    a1 = agent.act(s)
    ab, _ = agent.act_batch(s[None, :], agent.actor)
    assert a1 >= 1.0
    assert a1 == pytest.approx(float(ab[0]))


def test_warm_start_matches_heuristic():
    agent = DDPG(6, actor_init=heuristic_init_params("triangle"), seed=0)
    for h in [0, 1, 5]:
        s = np.array([h, 3.0, 4.0, 0.5, 0.6, 1.0])
        assert agent.act(s) == pytest.approx(9.0 * h + 1.0)


def test_explore_adds_noise_but_stays_positive():
    agent = DDPG(6, seed=3)
    s = np.zeros(6)
    acts = {agent.explore(s, sigma=5.0) for _ in range(50)}
    assert len(acts) > 1
    assert min(acts) > 0


def test_update_changes_parameters_and_targets_lag():
    rng = np.random.default_rng(4)
    agent = DDPG(4, seed=4, batch=16, tau=0.1)
    for _ in range(64):
        agent.replay.push(rng.random(4), rng.random() + 1, rng.random(), rng.random(4), False)
    W0 = agent.actor["W"].copy()
    C0 = agent.critic["W1"].copy()
    Wt0 = agent.actor_t["W"].copy()
    info = agent.update()
    assert np.isfinite(info["critic_loss"])
    assert not np.array_equal(agent.critic["W1"], C0)
    # targets move a fraction tau of the way
    drift_main = np.abs(agent.actor["W"] - W0).sum()
    drift_tgt = np.abs(agent.actor_t["W"] - Wt0).sum()
    assert drift_tgt <= drift_main + 1e-12


def test_critic_learns_simple_value():
    """Critic should fit a constant-reward, zero-discount problem."""
    rng = np.random.default_rng(5)
    agent = DDPG(3, seed=5, batch=32, gamma=0.0, lr=5e-3)
    for _ in range(256):
        s = rng.random(3)
        agent.replay.push(s, 1.0 + rng.random(), 2.0, rng.random(3), True)
    losses = [agent.update()["critic_loss"] for _ in range(400)]
    assert np.mean(losses[-50:]) < np.mean(losses[:50])
    assert np.mean(losses[-50:]) < 0.5


def test_actor_climbs_critic_gradient():
    """With a critic that rewards larger actions, the actor's output for a
    fixed state should increase over updates."""
    rng = np.random.default_rng(6)
    # positive warm start keeps the actor's ReLU active so gradients flow
    agent = DDPG(
        3, seed=6, batch=32, gamma=0.0, lr=5e-3,
        actor_init={"W": np.full((1, 3), 0.5), "b": np.zeros(1)},
    )
    # reward increases with action -> Q should learn to prefer large a
    for _ in range(512):
        s = rng.random(3) + 0.5
        a = 1.0 + 4 * rng.random()
        agent.replay.push(s, a, a, rng.random(3), True)
    s_probe = np.full(3, 1.0)
    a_before = agent.act(s_probe)
    for _ in range(600):
        agent.update()
    a_after = agent.act(s_probe)
    assert a_after > a_before
