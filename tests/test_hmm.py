"""Unit tests for the classic discrete HMM substrate (core/hmm.py)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.hmm import DiscreteHMM, fit_best_hmm, next_step_accuracy


def _planted_hmm(seed=0, n=3, m=5):
    """A well-separated HMM for parameter-recovery style tests."""
    g = np.random.default_rng(seed)
    A = np.full((n, n), 0.1 / (n - 1))
    np.fill_diagonal(A, 0.9)
    B = np.full((n, m), 0.05)
    for j in range(n):
        B[j, j % m] = 1.0
    B = B / B.sum(axis=1, keepdims=True)
    pi = np.full(n, 1.0 / n)
    return DiscreteHMM(n, m, pi=pi, A=A, B=B), g


def _sample(model, T, g):
    states = np.empty(T, dtype=np.int64)
    obs = np.empty(T, dtype=np.int64)
    s = g.choice(model.n_states, p=model.pi)
    for t in range(T):
        states[t] = s
        obs[t] = g.choice(model.n_obs, p=model.B[s])
        s = g.choice(model.n_states, p=model.A[s])
    return obs, states


class TestConstruction:
    def test_default_params_uniform(self):
        m = DiscreteHMM(3, 4)
        assert np.allclose(m.pi, 1 / 3)
        assert np.allclose(m.A, 1 / 3)
        assert np.allclose(m.B, 1 / 4)

    def test_params_normalized_on_init(self):
        m = DiscreteHMM(2, 2, pi=[2.0, 2.0], A=[[1, 3], [2, 2]], B=[[5, 5], [0, 1]])
        assert np.allclose(m.pi.sum(), 1.0)
        assert np.allclose(m.A.sum(axis=1), 1.0)
        assert np.allclose(m.B.sum(axis=1), 1.0)

    @pytest.mark.parametrize("n,m", [(0, 3), (3, 0), (-1, 2)])
    def test_invalid_sizes_raise(self, n, m):
        with pytest.raises(ValueError):
            DiscreteHMM(n, m)

    def test_randomize_is_deterministic(self):
        a = DiscreteHMM(3, 4).randomize(7)
        b = DiscreteHMM(3, 4).randomize(7)
        assert np.allclose(a.A, b.A) and np.allclose(a.B, b.B) and np.allclose(a.pi, b.pi)

    def test_randomize_differs_across_seeds(self):
        a = DiscreteHMM(3, 4).randomize(1)
        b = DiscreteHMM(3, 4).randomize(2)
        assert not np.allclose(a.A, b.A)

    def test_zero_row_falls_back_to_uniform(self):
        m = DiscreteHMM(2, 3, B=[[0, 0, 0], [1, 0, 0]])
        assert np.allclose(m.B[0], 1 / 3)


class TestForward:
    def test_alpha_rows_normalized(self):
        m = DiscreteHMM(3, 4).randomize(0)
        alpha, scale, ll = m.forward(np.array([0, 1, 2, 3, 0]))
        assert np.allclose(alpha.sum(axis=1), 1.0)
        assert np.isfinite(ll) and ll < 0

    def test_loglik_matches_bruteforce_enumeration(self):
        m = DiscreteHMM(2, 2).randomize(3)
        obs = np.array([0, 1, 1])
        total = 0.0
        for s0 in range(2):
            for s1 in range(2):
                for s2 in range(2):
                    total += (
                        m.pi[s0] * m.B[s0, obs[0]]
                        * m.A[s0, s1] * m.B[s1, obs[1]]
                        * m.A[s1, s2] * m.B[s2, obs[2]]
                    )
        assert np.isclose(m.loglik(obs), np.log(total))

    def test_single_observation(self):
        m = DiscreteHMM(2, 2).randomize(1)
        alpha, _, ll = m.forward(np.array([1]))
        assert alpha.shape == (1, 2)
        assert np.isclose(np.exp(ll), (m.pi * m.B[:, 1]).sum())

    def test_empty_sequence_raises(self):
        with pytest.raises(ValueError):
            DiscreteHMM(2, 2).forward(np.array([], dtype=int))

    def test_long_sequence_numerically_stable(self):
        m = DiscreteHMM(4, 6).randomize(2)
        g = np.random.default_rng(0)
        obs = g.integers(0, 6, 5000)
        _, _, ll = m.forward(obs)
        assert np.isfinite(ll)

    def test_backward_consistency(self):
        # sum_i alpha[t,i]*beta[t,i] == 1 for scaled passes, at every t.
        m = DiscreteHMM(3, 5).randomize(4)
        obs = np.array([0, 2, 4, 1, 3, 3, 0])
        alpha, scale, _ = m.forward(obs)
        beta = m.backward(obs, scale)
        assert np.allclose((alpha * beta).sum(axis=1), 1.0)


class TestFit:
    def test_loglik_nondecreasing_over_em(self):
        planted, g = _planted_hmm(0)
        obs, _ = _sample(planted, 200, g)
        m = DiscreteHMM(3, 5).randomize(1)
        lls = []
        cur = m
        for _ in range(8):
            lls.append(cur.loglik(obs))
            cur.fit(obs, n_iter=1, init=False)
        lls.append(cur.loglik(obs))
        assert all(b >= a - 1e-8 for a, b in zip(lls, lls[1:]))

    def test_fit_beats_uniform_model(self):
        planted, g = _planted_hmm(1)
        obs, _ = _sample(planted, 300, g)
        fitted = DiscreteHMM(3, 5).fit(obs, seed=0)
        uniform = DiscreteHMM(3, 5)
        assert fitted.loglik(obs) > uniform.loglik(obs)

    def test_fit_multiple_sequences(self):
        planted, g = _planted_hmm(2)
        seqs = [_sample(planted, 100, g)[0] for _ in range(5)]
        m = DiscreteHMM(3, 5).fit(seqs, seed=0)
        assert all(np.isfinite(m.loglik(s)) for s in seqs)

    def test_fit_recovers_emission_structure(self):
        # With near-deterministic emissions, the fitted model should predict
        # held-out data far better than chance.
        planted, g = _planted_hmm(0)
        obs, _ = _sample(planted, 500, g)
        m = DiscreteHMM(3, 5).fit(obs[:400], seed=0)
        acc = next_step_accuracy(m, obs, 400)
        assert acc > 0.5  # chance is 0.2; planted-model ceiling is ~0.74

    def test_fit_empty_raises(self):
        with pytest.raises(ValueError):
            DiscreteHMM(2, 2).fit([])

    def test_fit_single_state(self):
        obs = np.array([0, 1, 0, 1, 1, 0])
        m = DiscreteHMM(1, 2).fit(obs, seed=0)
        # one state => B row is just the empirical observation frequency
        assert np.allclose(m.B[0], [0.5, 0.5], atol=1e-6)

    def test_fit_deterministic_in_seed(self):
        planted, g = _planted_hmm(4)
        obs, _ = _sample(planted, 150, g)
        a = DiscreteHMM(3, 5).fit(obs, seed=9)
        b = DiscreteHMM(3, 5).fit(obs, seed=9)
        assert np.allclose(a.A, b.A) and np.allclose(a.B, b.B)

    def test_rows_are_distributions_after_fit(self):
        planted, g = _planted_hmm(5)
        obs, _ = _sample(planted, 100, g)
        m = DiscreteHMM(4, 5).fit(obs, seed=0)
        assert np.allclose(m.pi.sum(), 1.0)
        assert np.allclose(m.A.sum(axis=1), 1.0)
        assert np.allclose(m.B.sum(axis=1), 1.0)
        assert (m.A >= 0).all() and (m.B >= 0).all()


class TestViterbi:
    def test_deterministic_emissions_decode_exactly(self):
        planted, g = _planted_hmm(6)
        # make emissions exactly state-identifying
        planted.B = np.eye(3, 5)
        planted.B = planted.B / planted.B.sum(axis=1, keepdims=True)
        obs, states = _sample(planted, 50, g)
        assert np.array_equal(planted.viterbi(obs), states)

    def test_empty_sequence(self):
        assert len(DiscreteHMM(2, 2).viterbi(np.array([], dtype=int))) == 0

    def test_path_in_range(self):
        m = DiscreteHMM(3, 4).randomize(0)
        path = m.viterbi(np.array([0, 1, 2, 3, 2, 1]))
        assert path.min() >= 0 and path.max() < 3

    def test_single_step(self):
        m = DiscreteHMM(2, 2, pi=[0.9, 0.1], B=[[1, 0], [0, 1]])
        assert m.viterbi(np.array([0]))[0] == 0
        assert m.viterbi(np.array([1]))[0] == 1

    def test_viterbi_path_likelihood_maximal_bruteforce(self):
        m = DiscreteHMM(2, 3).randomize(11)
        obs = np.array([0, 2, 1, 1])
        path = m.viterbi(obs)

        def path_ll(p):
            ll = np.log(m.pi[p[0]]) + np.log(m.B[p[0], obs[0]])
            for t in range(1, len(obs)):
                ll += np.log(m.A[p[t - 1], p[t]]) + np.log(m.B[p[t], obs[t]])
            return ll

        best = max(
            path_ll([a, b, c, d])
            for a in range(2) for b in range(2) for c in range(2) for d in range(2)
        )
        assert np.isclose(path_ll(path), best)


class TestPrediction:
    def test_next_dist_is_distribution(self):
        m = DiscreteHMM(3, 5).randomize(1)
        d = m.predict_next_dist(np.array([0, 1, 2]))
        assert np.isclose(d.sum(), 1.0) and (d >= 0).all()

    def test_sticky_chain_predicts_same_symbol(self):
        planted, g = _planted_hmm(7)
        obs = np.zeros(20, dtype=np.int64)  # stuck in state 0 emitting 0
        assert planted.predict_next(obs) == 0

    def test_next_step_accuracy_bounds(self):
        m = DiscreteHMM(2, 3).randomize(0)
        obs = np.array([0, 1, 2, 0, 1, 2, 0, 1])
        acc = next_step_accuracy(m, obs, 4)
        assert 0.0 <= acc <= 1.0

    def test_next_step_accuracy_perfect_on_deterministic_cycle(self):
        # A 3-state deterministic cycle is learnable to perfect accuracy.
        obs = np.tile([0, 1, 2], 60)
        m = DiscreteHMM(3, 3).fit(obs[:120], seed=2)
        assert next_step_accuracy(m, obs, 120) == 1.0

    def test_next_step_accuracy_bad_start_raises(self):
        m = DiscreteHMM(2, 2)
        with pytest.raises(ValueError):
            next_step_accuracy(m, np.array([0, 1]), 0)
        with pytest.raises(ValueError):
            next_step_accuracy(m, np.array([0, 1]), 2)


class TestModelSelection:
    def test_fit_best_returns_valid_tuple(self):
        obs = np.tile([0, 1, 2, 3], 40)
        model, n, acc = fit_best_hmm(obs, 4, max_states=6, seed=0)
        assert 1 <= n <= 6
        assert 0.0 <= acc <= 1.0
        assert model.n_obs == 4

    def test_cycle_needs_multiple_states(self):
        # A deterministic 4-cycle cannot be predicted by a 1-state model.
        obs = np.tile([0, 1, 2, 3], 50)
        _, n, acc = fit_best_hmm(obs, 4, max_states=8, seed=0)
        assert n >= 2
        assert acc > 0.9

    def test_constant_sequence_one_state_suffices(self):
        obs = np.zeros(100, dtype=np.int64)
        _, n, acc = fit_best_hmm(obs, 3, max_states=8, seed=0)
        assert acc == 1.0
        assert n == 1  # peak reached immediately; search stops early


@settings(max_examples=25, deadline=None)
@given(
    n=st.integers(1, 4),
    m=st.integers(2, 5),
    seed=st.integers(0, 10_000),
    length=st.integers(1, 40),
)
def test_forward_always_finite_and_normalized(n, m, seed, length):
    g = np.random.default_rng(seed)
    model = DiscreteHMM(n, m).randomize(seed)
    obs = g.integers(0, m, length)
    alpha, scale, ll = model.forward(obs)
    assert np.isfinite(ll)
    assert np.allclose(alpha.sum(axis=1), 1.0)


@settings(max_examples=15, deadline=None)
@given(n=st.integers(1, 3), m=st.integers(2, 4), seed=st.integers(0, 1000))
def test_em_never_degrades_likelihood(n, m, seed):
    g = np.random.default_rng(seed)
    obs = g.integers(0, m, 60)
    model = DiscreteHMM(n, m).randomize(seed)
    before = model.loglik(obs)
    model.fit(obs, n_iter=3, init=False)
    assert model.loglik(obs) >= before - 1e-8
