"""Classic discrete-observation Hidden Markov Model.

This is the substrate for both the a-HMM layer of the paper's BiHMM
(Section IV-A, one HMM per media *producer*) and the plain-HMM baseline
of Fig. 5. It implements the three classic problems the paper relies on:

* likelihood / filtering via the *scaled* forward algorithm,
* parameter estimation via Baum-Welch EM (multiple sequences),
* decoding via the Viterbi algorithm,

plus next-observation prediction ``p(o_{T+1} | o_{1..T}) = alpha_T A B``,
which is how the paper turns an HMM into a next-category predictor
("predicts the category which a user may browse immediately after the
current time").

Everything is seeded numpy — deterministic given ``seed`` — so the Spark
``applyInPandas`` per-user fits are reproducible across runs and
partitionings.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

_EPS = 1e-12


def _rng(seed: int | np.random.Generator) -> np.random.Generator:
    if isinstance(seed, np.random.Generator):
        return seed
    return np.random.default_rng(seed)


def _row_normalize(m: np.ndarray) -> np.ndarray:
    """Normalise the last axis to a probability distribution.

    Rows that sum to ~0 (states never visited during EM) fall back to the
    uniform distribution so the model never emits NaNs.
    """
    m = np.asarray(m, dtype=np.float64)
    s = m.sum(axis=-1, keepdims=True)
    out = np.where(s > _EPS, m / np.maximum(s, _EPS), 1.0 / m.shape[-1])
    return out


@dataclass
class DiscreteHMM:
    """A discrete HMM with ``n_states`` hidden states over ``n_obs`` symbols.

    Parameters follow the paper's notation: ``pi`` is the initial state
    distribution, ``A[i, j] = p(S_j | S_i)`` the transition matrix and
    ``B[j, m] = p(c_m | S_j)`` the observation (emission) matrix.
    """

    n_states: int
    n_obs: int
    pi: np.ndarray = field(default=None, repr=False)  # type: ignore[assignment]
    A: np.ndarray = field(default=None, repr=False)  # type: ignore[assignment]
    B: np.ndarray = field(default=None, repr=False)  # type: ignore[assignment]

    def __post_init__(self) -> None:
        if self.n_states < 1 or self.n_obs < 1:
            raise ValueError("n_states and n_obs must be >= 1")
        n, m = self.n_states, self.n_obs
        if self.pi is None:
            self.pi = np.full(n, 1.0 / n)
        if self.A is None:
            self.A = np.full((n, n), 1.0 / n)
        if self.B is None:
            self.B = np.full((n, m), 1.0 / m)
        self.pi = _row_normalize(np.asarray(self.pi, dtype=np.float64))
        self.A = _row_normalize(np.asarray(self.A, dtype=np.float64))
        self.B = _row_normalize(np.asarray(self.B, dtype=np.float64))

    # ------------------------------------------------------------------ init

    def randomize(self, seed: int | np.random.Generator = 0) -> "DiscreteHMM":
        """Dirichlet-random parameters — the EM starting point."""
        g = _rng(seed)
        n, m = self.n_states, self.n_obs
        self.pi = g.dirichlet(np.ones(n))
        self.A = g.dirichlet(np.ones(n), size=n)
        self.B = g.dirichlet(np.ones(m), size=n)
        return self

    # -------------------------------------------------------------- forward

    def forward(self, obs: np.ndarray) -> tuple[np.ndarray, np.ndarray, float]:
        """Scaled forward pass.

        Returns ``(alpha, scale, loglik)`` where ``alpha[t]`` is the
        *normalised* filtering distribution ``p(S_t | o_{1..t})`` and
        ``loglik = sum(log scale)`` is ``log p(o_{1..T})``.
        """
        obs = np.asarray(obs, dtype=np.int64)
        T = len(obs)
        if T == 0:
            raise ValueError("empty observation sequence")
        alpha = np.empty((T, self.n_states))
        scale = np.empty(T)
        a = self.pi * self.B[:, obs[0]]
        scale[0] = max(a.sum(), _EPS)
        alpha[0] = a / scale[0]
        for t in range(1, T):
            a = (alpha[t - 1] @ self.A) * self.B[:, obs[t]]
            scale[t] = max(a.sum(), _EPS)
            alpha[t] = a / scale[t]
        return alpha, scale, float(np.log(scale).sum())

    def backward(self, obs: np.ndarray, scale: np.ndarray) -> np.ndarray:
        """Scaled backward pass matching ``forward``'s scaling factors."""
        obs = np.asarray(obs, dtype=np.int64)
        T = len(obs)
        beta = np.empty((T, self.n_states))
        beta[-1] = 1.0
        for t in range(T - 2, -1, -1):
            beta[t] = (self.A @ (self.B[:, obs[t + 1]] * beta[t + 1])) / scale[t + 1]
        return beta

    def loglik(self, obs: np.ndarray) -> float:
        """``log p(o_{1..T})`` under the current parameters."""
        return self.forward(obs)[2]

    # ------------------------------------------------------------------- EM

    def fit(
        self,
        sequences: list[np.ndarray] | np.ndarray,
        *,
        n_iter: int = 30,
        tol: float = 1e-4,
        seed: int | np.random.Generator = 0,
        init: bool = True,
        n_restarts: int = 3,
    ) -> "DiscreteHMM":
        """Baum-Welch over one or more observation sequences.

        ``sequences`` may be a single 1-D array or a list of them. EM stops
        after ``n_iter`` iterations or when the total log-likelihood
        improves by less than ``tol``. With ``init=True`` and
        ``n_restarts > 1``, EM runs from several seeded random starts and
        keeps the parameters with the best training log-likelihood —
        Baum-Welch is a local optimiser, and a single start is not reliable.
        """
        if isinstance(sequences, np.ndarray) and sequences.ndim == 1:
            sequences = [sequences]
        seqs = [np.asarray(s, dtype=np.int64) for s in sequences if len(s) > 0]
        if not seqs:
            raise ValueError("no non-empty sequences to fit")
        if init and n_restarts > 1 and isinstance(seed, int):
            best: tuple[float, np.ndarray, np.ndarray, np.ndarray] | None = None
            for r in range(n_restarts):
                self.randomize(seed + 104729 * r)
                self.fit(seqs, n_iter=n_iter, tol=tol, init=False)
                ll = sum(self.loglik(s) for s in seqs)
                if best is None or ll > best[0]:
                    best = (ll, self.pi.copy(), self.A.copy(), self.B.copy())
            assert best is not None
            _, self.pi, self.A, self.B = best
            return self
        if init:
            self.randomize(seed)
        prev_ll = -np.inf
        for _ in range(n_iter):
            pi_acc = np.zeros(self.n_states)
            xi_acc = np.zeros((self.n_states, self.n_states))
            gb_acc = np.zeros((self.n_states, self.n_obs))
            total_ll = 0.0
            for obs in seqs:
                alpha, scale, ll = self.forward(obs)
                beta = self.backward(obs, scale)
                total_ll += ll
                gamma = _row_normalize(alpha * beta)
                pi_acc += gamma[0]
                np.add.at(gb_acc.T, obs, gamma)
                for t in range(len(obs) - 1):
                    xi = (
                        alpha[t][:, None]
                        * self.A
                        * (self.B[:, obs[t + 1]] * beta[t + 1])[None, :]
                    ) / scale[t + 1]
                    xi_acc += xi
            self.pi = _row_normalize(pi_acc)
            self.A = _row_normalize(xi_acc)
            self.B = _row_normalize(gb_acc)
            if total_ll - prev_ll < tol and np.isfinite(prev_ll):
                break
            prev_ll = total_ll
        return self

    # -------------------------------------------------------------- decoding

    def canonicalize(self) -> "DiscreteHMM":
        """Relabel hidden states into a canonical order.

        HMM states are only identified up to permutation; when decoded
        states from *different* models are pooled (the BiHMM conditions one
        consumer's b-HMM on states decoded from several producers' a-HMMs),
        the labels must be comparable. States are ordered by the expectation
        of the observation index under their emission row — a deterministic,
        data-driven convention that never consults ground truth.
        """
        centre = self.B @ np.arange(self.n_obs, dtype=np.float64)
        perm = np.lexsort((np.arange(self.n_states), centre))
        self.pi = self.pi[perm]
        self.A = self.A[np.ix_(perm, perm)]
        self.B = self.B[perm]
        return self

    def viterbi(self, obs: np.ndarray) -> np.ndarray:
        """Most likely hidden-state path for ``obs`` (log-space Viterbi)."""
        obs = np.asarray(obs, dtype=np.int64)
        T = len(obs)
        if T == 0:
            return np.empty(0, dtype=np.int64)
        logA = np.log(np.maximum(self.A, _EPS))
        logB = np.log(np.maximum(self.B, _EPS))
        delta = np.log(np.maximum(self.pi, _EPS)) + logB[:, obs[0]]
        back = np.zeros((T, self.n_states), dtype=np.int64)
        for t in range(1, T):
            cand = delta[:, None] + logA
            back[t] = cand.argmax(axis=0)
            delta = cand.max(axis=0) + logB[:, obs[t]]
        path = np.empty(T, dtype=np.int64)
        path[-1] = int(delta.argmax())
        for t in range(T - 2, -1, -1):
            path[t] = back[t + 1][path[t + 1]]
        return path

    # ------------------------------------------------------------ prediction

    def state_posterior(self, obs: np.ndarray) -> np.ndarray:
        """Filtering distribution ``p(S_T | o_{1..T})`` (prediction-smoothed:
        see :func:`pred_smoothed`)."""
        A, B = pred_smoothed(self.A, self.B)
        obs = np.asarray(obs, dtype=np.int64)
        a = self.pi * B[:, obs[0]]
        a = a / max(a.sum(), _EPS)
        for t in range(1, len(obs)):
            a = (a @ A) * B[:, obs[t]]
            a = a / max(a.sum(), _EPS)
        return a

    def predict_next_state_dist(self, obs: np.ndarray) -> np.ndarray:
        """``p(S_{T+1} | o_{1..T})``."""
        A, _ = pred_smoothed(self.A, self.B)
        return self.state_posterior(obs) @ A

    def predict_next_dist(self, obs: np.ndarray) -> np.ndarray:
        """``p(o_{T+1} | o_{1..T})`` — the paper's next-category predictor."""
        _, B = pred_smoothed(self.A, self.B)
        return self.predict_next_state_dist(obs) @ B

    def predict_next(self, obs: np.ndarray) -> int:
        """argmax next observation — used for Fig. 5 Accuracy."""
        return int(self.predict_next_dist(obs).argmax())


#: mixed into A and B at *prediction* time only. EM can drive entries to an
#: exact 0; a held-out observation with zero emission probability would then
#: collapse the filtering distribution to the zero vector and every later
#: prediction with it. Training and likelihoods stay un-smoothed.
PRED_EPS = 1e-6


def pred_smoothed(A: np.ndarray, B: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Floored copies of the transition/emission matrices for prediction."""
    return (
        (1.0 - PRED_EPS) * A + PRED_EPS / A.shape[-1],
        (1.0 - PRED_EPS) * B + PRED_EPS / B.shape[-1],
    )


def next_step_accuracy(model: DiscreteHMM, obs: np.ndarray, start: int) -> float:
    """Fraction of held-out positions ``t >= start`` whose observation is
    correctly predicted from the prefix ``o_{1..t-1}`` (Fig. 5 protocol:
    "the correct prediction percentage of a user's next interest category").

    Computed incrementally with a single forward sweep, so evaluating a
    length-T history costs O(T·N²) not O(T²·N²).
    """
    obs = np.asarray(obs, dtype=np.int64)
    if not 0 < start < len(obs):
        raise ValueError("start must split the sequence into non-empty parts")
    A, B = pred_smoothed(model.A, model.B)
    hits = 0
    a = model.pi * B[:, obs[0]]
    a = a / max(a.sum(), _EPS)
    for t in range(1, len(obs)):
        pred = int(((a @ A) @ B).argmax())
        if t >= start:
            hits += int(pred == obs[t])
        a = (a @ A) * B[:, obs[t]]
        a = a / max(a.sum(), _EPS)
    return hits / (len(obs) - start)


def fit_best_hmm(
    obs: np.ndarray,
    n_obs: int,
    *,
    max_states: int = 8,
    train_frac: float = 0.8,
    seed: int = 0,
    n_iter: int = 25,
) -> tuple[DiscreteHMM, int, float]:
    """Model selection exactly as Section VI-C.1.

    The first ``train_frac`` of the history trains candidate HMMs with
    1..``max_states`` states; held-out next-step Accuracy on the remainder
    picks the winner, stopping once Accuracy passes its peak ("from 1 to a
    number where the Accuracy reaches the peak"). Returns
    ``(model, n_states, accuracy)``.
    """
    obs = np.asarray(obs, dtype=np.int64)
    start = max(1, min(len(obs) - 1, int(round(len(obs) * train_frac))))
    train = obs[:start]
    best: tuple[DiscreteHMM, int, float] | None = None
    for n in range(1, max_states + 1):
        m = DiscreteHMM(n, n_obs).fit(train, seed=seed + n, n_iter=n_iter)
        acc = next_step_accuracy(m, obs, start)
        if best is None or acc > best[2]:
            best = (m, n, acc)
        elif acc < best[2]:  # past the peak — stop, per the paper
            break
    assert best is not None
    return best
