"""Unit tests for the numpy DQN."""
import numpy as np
import pytest

from repro.core.dqn import DQN, MLP


class TestMLP:
    def test_forward_shape(self):
        net = MLP(4, 3)
        assert net.forward(np.zeros(4)).shape == (1, 3)
        assert net.forward(np.zeros((7, 4))).shape == (7, 3)

    def test_train_reduces_loss_on_fixed_target(self):
        g = np.random.default_rng(0)
        net = MLP(4, 3, lr=0.01, seed=0)
        x = g.normal(size=(64, 4))
        a = g.integers(0, 3, 64)
        target = np.sin(x.sum(axis=1)) + a
        losses = [net.train_on(x, a, target) for _ in range(400)]
        assert losses[-1] < losses[0] * 0.2

    def test_gradient_matches_finite_difference(self):
        net = MLP(3, 2, lr=0.0, seed=1)  # lr=0 → params unchanged by step
        x = np.array([[0.3, -0.2, 0.5]])
        a = np.array([1])
        tgt = np.array([0.7])

        def loss():
            q = net.forward(x)[0, 1]
            return 0.5 * (q - tgt[0]) ** 2

        # finite-difference on one weight vs analytic Adam direction sign
        eps = 1e-6
        base = loss()
        net.params["W2"][0, 1] += eps
        up = loss()
        net.params["W2"][0, 1] -= eps
        fd = (up - base) / eps
        # recompute analytic grad
        h = np.tanh(x @ net.params["W1"] + net.params["b1"])
        q = (h @ net.params["W2"] + net.params["b2"])[0, 1]
        analytic = (q - tgt[0]) * h[0, 0]
        assert fd == pytest.approx(analytic, rel=1e-3)

    def test_copy_from_is_deep(self):
        a, b = MLP(2, 2, seed=0), MLP(2, 2, seed=1)
        b.copy_from(a)
        assert np.allclose(a.params["W1"], b.params["W1"])
        b.params["W1"] += 1.0
        assert not np.allclose(a.params["W1"], b.params["W1"])


class TestDQN:
    def test_act_respects_mask(self):
        agent = DQN(4, 5, eps=0.0, seed=0)
        mask = np.array([False, True, False, False, False])
        for _ in range(10):
            assert agent.act(np.zeros(4), mask) == 1

    def test_act_random_respects_mask(self):
        agent = DQN(4, 5, eps=1.0, seed=0)
        mask = np.array([False, True, False, True, False])
        acts = {agent.act(np.zeros(4), mask) for _ in range(50)}
        assert acts <= {1, 3}

    def test_no_valid_action_raises(self):
        agent = DQN(4, 5, seed=0)
        with pytest.raises(ValueError):
            agent.act(np.zeros(4), np.zeros(5, dtype=bool))

    def test_learn_needs_batch(self):
        agent = DQN(2, 2, batch_size=8, seed=0)
        agent.remember(np.zeros(2), 0, 1.0, np.zeros(2), False)
        assert agent.learn() is None

    def test_eps_decays_to_minimum(self):
        agent = DQN(2, 2, batch_size=4, eps=1.0, eps_min=0.1, eps_decay=0.5, seed=0)
        for _ in range(20):
            agent.remember(np.zeros(2), 0, 1.0, np.zeros(2), False)
        for _ in range(30):
            agent.learn()
        assert agent.eps == pytest.approx(0.1)

    def test_bandit_learns_best_action(self):
        # 2-armed contextual-free bandit: action 1 pays 1, action 0 pays 0.
        agent = DQN(2, 2, gamma=0.0, eps=0.3, eps_min=0.05, eps_decay=0.99,
                    batch_size=16, lr=0.02, seed=0)
        s = np.array([1.0, 0.0])
        for _ in range(300):
            a = agent.act(s)
            agent.remember(s, a, float(a == 1), None, True)
            agent.learn()
        assert agent.act(s, greedy=True) == 1

    def test_roundtrip_serialization(self):
        agent = DQN(6, 3, seed=5)
        clone = DQN.from_bytes(agent.to_bytes())
        s = np.linspace(0, 1, 6)
        assert np.allclose(agent.q.forward(s), clone.q.forward(s))
        assert clone.eps == 0.0  # deserialized policies act greedily

    def test_target_network_sync(self):
        agent = DQN(2, 2, batch_size=4, target_sync=5, seed=0)
        for _ in range(10):
            agent.remember(np.ones(2), 0, 1.0, np.ones(2), False)
        for _ in range(5):
            agent.learn()
        assert np.allclose(agent.q.params["W1"], agent.target.params["W1"])
