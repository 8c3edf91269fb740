"""Unit tests for the Bi-Layer HMM (core/bihmm.py)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.bihmm import BiHMM, ConditionalHMM, conditional_next_step_accuracy
from repro.core.hmm import DiscreteHMM, next_step_accuracy


def _sample_conditional(model, zs, g):
    """Sample an observation sequence from a ConditionalHMM driven by ``zs``."""
    T = len(zs)
    obs = np.empty(T, dtype=np.int64)
    s = g.choice(model.n_states, p=model.pi)
    for t in range(T):
        obs[t] = g.choice(model.n_obs, p=model.B[zs[t], s])
        if t + 1 < T:
            s = g.choice(model.n_states, p=model.A[zs[t], s])
    return obs


class TestConstruction:
    def test_defaults_uniform(self):
        m = ConditionalHMM(2, 3, 4)
        assert m.A.shape == (4, 2, 2)
        assert m.B.shape == (4, 2, 3)
        assert np.allclose(m.A.sum(axis=-1), 1.0)
        assert np.allclose(m.B.sum(axis=-1), 1.0)

    @pytest.mark.parametrize("n,m,z", [(0, 2, 2), (2, 0, 2), (2, 2, 0)])
    def test_invalid_sizes_raise(self, n, m, z):
        with pytest.raises(ValueError):
            ConditionalHMM(n, m, z)

    def test_randomize_deterministic(self):
        a = ConditionalHMM(2, 3, 2).randomize(5)
        b = ConditionalHMM(2, 3, 2).randomize(5)
        assert np.allclose(a.A, b.A) and np.allclose(a.B, b.B)


class TestForwardBackward:
    def test_nz1_matches_plain_hmm(self):
        """With a single conditioning value, ConditionalHMM == DiscreteHMM."""
        plain = DiscreteHMM(3, 4).randomize(1)
        cond = ConditionalHMM(3, 4, 1, pi=plain.pi, A=plain.A[None], B=plain.B[None])
        obs = np.array([0, 3, 2, 1, 1, 0])
        zs = np.zeros(len(obs), dtype=np.int64)
        assert np.isclose(cond.loglik(obs, zs), plain.loglik(obs))

    def test_alpha_normalized(self):
        m = ConditionalHMM(3, 4, 2).randomize(0)
        obs = np.array([0, 1, 2, 3])
        zs = np.array([0, 1, 0, 1])
        alpha, _, ll = m.forward(obs, zs)
        assert np.allclose(alpha.sum(axis=1), 1.0) and np.isfinite(ll)

    def test_loglik_matches_bruteforce(self):
        m = ConditionalHMM(2, 2, 2).randomize(7)
        obs = np.array([0, 1, 1])
        zs = np.array([1, 0, 1])
        total = 0.0
        for s0 in range(2):
            for s1 in range(2):
                for s2 in range(2):
                    total += (
                        m.pi[s0] * m.B[zs[0], s0, obs[0]]
                        * m.A[zs[0], s0, s1] * m.B[zs[1], s1, obs[1]]
                        * m.A[zs[1], s1, s2] * m.B[zs[2], s2, obs[2]]
                    )
        assert np.isclose(m.loglik(obs, zs), np.log(total))

    def test_mismatched_lengths_raise(self):
        m = ConditionalHMM(2, 2, 2)
        with pytest.raises(ValueError):
            m.forward(np.array([0, 1]), np.array([0]))

    def test_empty_raises(self):
        m = ConditionalHMM(2, 2, 2)
        with pytest.raises(ValueError):
            m.forward(np.array([], dtype=int), np.array([], dtype=int))

    def test_forward_backward_consistency(self):
        m = ConditionalHMM(3, 4, 2).randomize(3)
        obs = np.array([0, 2, 1, 3, 3, 0, 2])
        zs = np.array([0, 0, 1, 1, 0, 1, 0])
        alpha, scale, _ = m.forward(obs, zs)
        beta = m.backward(obs, zs, scale)
        assert np.allclose((alpha * beta).sum(axis=1), 1.0)


class TestFit:
    def test_em_improves_loglik(self):
        g = np.random.default_rng(0)
        truth = ConditionalHMM(2, 3, 2).randomize(1)
        zs = g.integers(0, 2, 200)
        obs = _sample_conditional(truth, zs, g)
        m = ConditionalHMM(2, 3, 2).randomize(9)
        before = m.loglik(obs, zs)
        m.fit([(obs, zs)], n_iter=10, init=False)
        assert m.loglik(obs, zs) > before

    def test_em_monotone(self):
        g = np.random.default_rng(1)
        zs = g.integers(0, 2, 100)
        obs = g.integers(0, 3, 100)
        m = ConditionalHMM(2, 3, 2).randomize(2)
        lls = [m.loglik(obs, zs)]
        for _ in range(6):
            m.fit([(obs, zs)], n_iter=1, init=False)
            lls.append(m.loglik(obs, zs))
        assert all(b >= a - 1e-8 for a, b in zip(lls, lls[1:]))

    def test_rows_are_distributions_after_fit(self):
        g = np.random.default_rng(2)
        zs = g.integers(0, 3, 120)
        obs = g.integers(0, 4, 120)
        m = ConditionalHMM(3, 4, 3).fit([(obs, zs)], seed=0)
        assert np.allclose(m.A.sum(axis=-1), 1.0)
        assert np.allclose(m.B.sum(axis=-1), 1.0)
        assert np.allclose(m.pi.sum(), 1.0)

    def test_unvisited_z_rows_stay_uniform(self):
        obs = np.array([0, 1, 0, 1, 0, 1])
        zs = np.zeros(6, dtype=np.int64)  # z=1 never visited
        m = ConditionalHMM(2, 2, 2).fit([(obs, zs)], seed=0, n_restarts=1)
        assert np.allclose(m.A[1], 0.5)
        assert np.allclose(m.B[1], 0.5)

    def test_fit_empty_raises(self):
        with pytest.raises(ValueError):
            ConditionalHMM(2, 2, 2).fit([])

    def test_fit_deterministic(self):
        g = np.random.default_rng(3)
        zs = g.integers(0, 2, 80)
        obs = g.integers(0, 3, 80)
        a = ConditionalHMM(2, 3, 2).fit([(obs, zs)], seed=4)
        b = ConditionalHMM(2, 3, 2).fit([(obs, zs)], seed=4)
        assert np.allclose(a.A, b.A) and np.allclose(a.B, b.B)

    def test_conditional_model_learns_z_dependence(self):
        """Observations fully determined by z => fitted B must reflect it."""
        g = np.random.default_rng(4)
        zs = g.integers(0, 2, 400)
        obs = zs.copy()  # category == producer state
        m = ConditionalHMM(2, 2, 2).fit([(obs, zs)], seed=0)
        # under z=0, the emitted symbol is always 0 regardless of state
        assert (m.B[0, :, 0] > 0.95).all()
        assert (m.B[1, :, 1] > 0.95).all()


class TestPrediction:
    def test_next_dist_is_distribution(self):
        m = ConditionalHMM(2, 3, 2).randomize(0)
        d = m.predict_next_dist(np.array([0, 1]), np.array([0, 1]), z_next=0)
        assert np.isclose(d.sum(), 1.0) and (d >= 0).all()

    def test_z_determined_prediction(self):
        g = np.random.default_rng(5)
        zs = g.integers(0, 2, 300)
        obs = zs.copy()
        m = ConditionalHMM(2, 2, 2).fit([(obs, zs)], seed=0)
        assert m.predict_next(obs[:50], zs[:50], z_next=0) == 0
        assert m.predict_next(obs[:50], zs[:50], z_next=1) == 1

    def test_accuracy_bounds(self):
        m = ConditionalHMM(2, 3, 2).randomize(1)
        obs = np.array([0, 1, 2, 0, 1, 2])
        zs = np.array([0, 0, 1, 1, 0, 0])
        acc = conditional_next_step_accuracy(m, obs, zs, 3)
        assert 0.0 <= acc <= 1.0

    def test_accuracy_bad_start_raises(self):
        m = ConditionalHMM(2, 2, 2)
        with pytest.raises(ValueError):
            conditional_next_step_accuracy(m, np.array([0, 1]), np.array([0, 0]), 0)


class TestBiHMMBeatsHMM:
    """The core scientific claim of Fig. 5, at unit-test scale: when consumer
    behaviour genuinely depends on the producer state, the BiHMM predicts the
    next category better than a plain HMM."""

    @staticmethod
    def _producer_driven_data(seed, T=600):
        g = np.random.default_rng(seed)
        # producer: slow 2-state chain; consumer's category = producer state
        # mapped through the consumer's own fast-flipping taste, with noise.
        pz = 0
        zs = np.empty(T, dtype=np.int64)
        obs = np.empty(T, dtype=np.int64)
        taste = 0
        for t in range(T):
            if g.random() < 0.05:
                pz = 1 - pz
            taste = (taste + 1) % 2
            zs[t] = pz
            # category strongly determined by producer state XOR own taste
            cat = (pz * 2 + taste) if g.random() < 0.9 else g.integers(0, 4)
            obs[t] = cat
        return obs, zs

    def test_bihmm_outperforms_hmm(self):
        obs, zs = self._producer_driven_data(0)
        start = 480
        plain, _, acc_hmm = None, None, 0.0
        best = 0.0
        for n in range(1, 5):
            m = DiscreteHMM(n, 4).fit(obs[:start], seed=n)
            best = max(best, next_step_accuracy(m, obs, start))
        acc_hmm = best
        cond = ConditionalHMM(2, 4, 2).fit([(obs[:start], zs[:start])], seed=0)
        acc_bi = conditional_next_step_accuracy(cond, obs, zs, start)
        assert acc_bi > acc_hmm


class TestBiHMMOrchestration:
    def test_fit_producers_and_decode(self):
        g = np.random.default_rng(0)
        seqs = {"p1": np.tile([0, 1], 40), "p2": g.integers(0, 3, 60)}
        bi = BiHMM(n_categories=3, n_z=2).fit_producers(seqs, seed=0)
        assert set(bi.producer_models) == {"p1", "p2"}
        z = bi.decode_producer("p1", seqs["p1"])
        assert len(z) == 80 and z.max() < 2

    def test_decode_unknown_producer_is_zeros(self):
        bi = BiHMM(n_categories=3, n_z=2)
        z = bi.decode_producer("nope", np.array([0, 1, 2]))
        assert np.array_equal(z, np.zeros(3, dtype=np.int64))

    def test_fit_consumer_returns_conditional(self):
        bi = BiHMM(n_categories=3, n_z=2, n_states=2)
        obs = np.array([0, 1, 2, 0, 1, 2, 0, 1])
        zs = np.array([0, 0, 1, 1, 0, 0, 1, 1])
        m = bi.fit_consumer(obs, zs, seed=0)
        assert isinstance(m, ConditionalHMM)
        assert m.n_obs == 3 and m.n_z == 2

    def test_producer_fit_deterministic_in_dict_order(self):
        seqs = {"b": np.tile([0, 1], 30), "a": np.tile([1, 0], 30)}
        bi1 = BiHMM(n_categories=2, n_z=2).fit_producers(dict(seqs), seed=0)
        bi2 = BiHMM(n_categories=2, n_z=2).fit_producers(
            dict(reversed(list(seqs.items()))), seed=0
        )
        for p in seqs:
            assert np.allclose(bi1.producer_models[p].A, bi2.producer_models[p].A)


@settings(max_examples=20, deadline=None)
@given(
    n=st.integers(1, 3),
    m=st.integers(2, 4),
    nz=st.integers(1, 3),
    seed=st.integers(0, 5000),
    length=st.integers(1, 30),
)
def test_conditional_forward_always_valid(n, m, nz, seed, length):
    g = np.random.default_rng(seed)
    model = ConditionalHMM(n, m, nz).randomize(seed)
    obs = g.integers(0, m, length)
    zs = g.integers(0, nz, length)
    alpha, _, ll = model.forward(obs, zs)
    assert np.isfinite(ll)
    assert np.allclose(alpha.sum(axis=1), 1.0)
