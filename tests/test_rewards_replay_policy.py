"""Tests for reward shaping (Eq. 7-10), the replay buffer and the policy."""
import numpy as np
import pytest

from repro.core.operators import ALL_OPS
from repro.core.policy import STATE_DIM, AgentPolicy, state_embedding
from repro.core.replay import ReplayBuffer
from repro.core.rewards import discounted_returns, lambda_returns, pseudo_score
from repro.core.transform import apply_op, leaf


class TestPseudoScore:
    def test_neutral_probability_gives_base(self):
        assert pseudo_score(0.5, 0.7) == pytest.approx(0.7)

    def test_confident_positive_gives_max_gain(self):
        a = pseudo_score(1.0, 0.7, d_a_max=0.2, thre=0.01)
        assert a == pytest.approx(0.7 + (0.2 - 0.01))

    def test_confident_negative_gives_min(self):
        a = pseudo_score(0.0, 0.7, d_a_min=-0.15, thre=0.01)
        assert a == pytest.approx(0.7 + (-0.15 + 0.01))

    def test_monotone_in_p(self):
        ps = np.linspace(0, 1, 11)
        scores = [pseudo_score(p, 0.5) for p in ps]
        assert (np.diff(scores) >= -1e-12).all()

    def test_clips_out_of_range(self):
        assert pseudo_score(1.5, 0.5) == pseudo_score(1.0, 0.5)


class TestReturns:
    def test_discounted_manual(self):
        r = np.array([1.0, 0.0, 2.0])
        u = discounted_returns(r, gamma=0.5)
        np.testing.assert_allclose(u, [1 + 0 + 0.25 * 2, 0 + 0.5 * 2, 2.0])

    def test_gamma_zero_is_identity(self):
        r = np.array([0.3, -0.2, 0.9])
        np.testing.assert_allclose(discounted_returns(r, 0.0), r)

    def test_lambda_one_recovers_monte_carlo(self):
        r = np.array([0.5, -0.1, 0.2, 0.7])
        np.testing.assert_allclose(
            lambda_returns(r, gamma=0.9, lam=1.0), discounted_returns(r, 0.9)
        )

    def test_lambda_zero_is_one_step(self):
        r = np.array([0.5, -0.1, 0.2])
        u = lambda_returns(r, gamma=0.9, lam=0.0)
        # n=1 returns are just r_t except at the terminal truncation
        np.testing.assert_allclose(u[:-1], r[:-1])
        np.testing.assert_allclose(u[-1], r[-1])

    def test_empty_rewards(self):
        assert discounted_returns(np.array([])).shape == (0,)
        assert lambda_returns(np.array([])).shape == (0,)

    def test_single_reward(self):
        np.testing.assert_allclose(lambda_returns(np.array([2.0])), [2.0])


class TestReplayBuffer:
    def _spec(self, i):
        return apply_op("log", leaf(i))

    def test_add_and_contains(self):
        b = ReplayBuffer()
        s = self._spec(0)
        assert b.add(s, agent=0, p=0.9)
        assert s in b and len(b) == 1

    def test_dedup_keeps_best_p(self):
        b = ReplayBuffer()
        s = self._spec(1)
        b.add(s, 0, 0.6)
        assert not b.add(s, 0, 0.8)  # duplicate: no new slot
        assert b.entries()[0].p == 0.8

    def test_capacity_eviction(self):
        b = ReplayBuffer(capacity=2)
        b.add(self._spec(0), 0, 0.2)
        b.add(self._spec(1), 0, 0.9)
        b.add(self._spec(2), 0, 0.5)  # evicts the 0.2 entry
        names = {e.spec.name for e in b.entries()}
        assert names == {"log(f1)", "log(f2)"}

    def test_no_eviction_for_worse(self):
        b = ReplayBuffer(capacity=1)
        b.add(self._spec(0), 0, 0.9)
        assert not b.add(self._spec(1), 0, 0.1)
        assert len(b) == 1

    def test_entries_sorted_desc(self):
        b = ReplayBuffer()
        b.add(self._spec(0), 0, 0.3)
        b.add(self._spec(1), 0, 0.7)
        ps = [e.p for e in b.entries()]
        assert ps == sorted(ps, reverse=True)


class TestStateEmbedding:
    def test_shape_and_bounds(self):
        v = np.random.default_rng(0).normal(size=200)
        e = state_embedding(v, subgroup_size=3, t=5)
        assert e.shape == (STATE_DIM,)
        assert (np.abs(e) <= 1.0).all()

    def test_handles_nonfinite(self):
        v = np.array([np.nan, np.inf, 1.0, -1.0])
        assert np.isfinite(state_embedding(v, 1, 0)).all()

    def test_constant_vector(self):
        e = state_embedding(np.ones(10), 2, 1)
        assert np.isfinite(e).all()


class TestAgentPolicy:
    def test_probs_sum_to_one(self):
        a = AgentPolicy(seed=0)
        p, _ = a.probs(np.zeros(STATE_DIM))
        assert p.shape == (len(ALL_OPS),)
        assert p.sum() == pytest.approx(1.0)

    def test_initial_distribution_near_uniform(self):
        a = AgentPolicy(seed=0)
        a.reset()
        p, _ = a.probs(np.zeros(STATE_DIM))
        assert p.max() - p.min() < 0.1

    def test_act_returns_valid_action(self):
        a = AgentPolicy(seed=1)
        act, cache = a.act(np.zeros(STATE_DIM))
        assert 0 <= act < len(ALL_OPS)
        assert cache["a"] == act

    def test_update_reinforces_rewarded_action(self):
        a = AgentPolicy(seed=2, lr=0.05, entropy_coef=0.0)
        x = np.zeros(STATE_DIM)
        target = 3
        for _ in range(60):
            a.reset()
            p, cache = a.probs(x)
            cache["a"] = target
            # Hand the agent a positive return for `target`, negative
            # baseline comes from a second step with another action.
            other = {**cache, "a": (target + 1) % len(ALL_OPS)}
            a.update([(cache, 1.0), (other, -1.0)])
        a.reset()
        p, _ = a.probs(x)
        assert np.argmax(p) == target

    def test_update_empty_is_noop(self):
        a = AgentPolicy(seed=3)
        w = a.Wo.copy()
        a.update([])
        np.testing.assert_array_equal(w, a.Wo)

    def test_hidden_state_evolves(self):
        a = AgentPolicy(seed=4)
        a.reset()
        h0 = a.h.copy()
        a.probs(np.ones(STATE_DIM) * 0.3)
        assert not np.allclose(h0, a.h)

    def test_greedy_act_deterministic(self):
        a = AgentPolicy(seed=5)
        a.reset()
        act1, _ = a.act(np.zeros(STATE_DIM), greedy=True)
        a.reset()
        act2, _ = a.act(np.zeros(STATE_DIM), greedy=True)
        assert act1 == act2
