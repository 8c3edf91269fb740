"""The paper's Bi-Layer Hidden Markov Model (BiHMM, Section IV-A).

The BiHMM has two layers:

* **a-HMM** — one classic :class:`~repro.core.hmm.DiscreteHMM` per media
  *producer*, trained on the category sequence of the items that producer
  created. Viterbi decoding gives the producer's hidden state ``Z`` at the
  creation time of every item.
* **b-HMM** — models each *consumer*. The paper reformulates its states as
  joint ``U' = (U, Z)``, where ``Z`` is the (decoded, hence observed) hidden
  state of the producer of the item the consumer just browsed. Marginalising
  the clamped ``Z`` component analytically, this is EM over a *conditional*
  HMM with a transition tensor ``A[z, i, j] = p(U_j | U_i, Z=z)`` and an
  emission tensor ``B[z, j, m] = p(c_m | U_j, Z=z)`` — which is what
  :class:`ConditionalHMM` implements (see DESIGN.md §3 for the equivalence
  argument).

All producers share the a-HMM state *count* so that a single conditioning
index space ``0..n_z-1`` exists, matching the paper's ``(N_b × N_a)``-sized
``A'`` matrix.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.core.hmm import DiscreteHMM, _EPS, _row_normalize, _rng

__all__ = ["ConditionalHMM", "BiHMM", "conditional_next_step_accuracy"]


@dataclass
class ConditionalHMM:
    """A discrete HMM whose transitions and emissions are conditioned on an
    *observed* side sequence ``z`` (the decoded producer states).

    ``pi`` is ``(n_states,)``; ``A`` is ``(n_z, n_states, n_states)`` with
    ``A[z, i, j] = p(U_j | U_i, Z=z)``; ``B`` is ``(n_z, n_states, n_obs)``
    with ``B[z, j, m] = p(c_m | U_j, Z=z)``. Setting ``n_z = 1`` recovers a
    plain HMM — a property the tests exploit.
    """

    n_states: int
    n_obs: int
    n_z: int
    pi: np.ndarray = field(default=None, repr=False)  # type: ignore[assignment]
    A: np.ndarray = field(default=None, repr=False)  # type: ignore[assignment]
    B: np.ndarray = field(default=None, repr=False)  # type: ignore[assignment]

    def __post_init__(self) -> None:
        if min(self.n_states, self.n_obs, self.n_z) < 1:
            raise ValueError("n_states, n_obs and n_z must be >= 1")
        n, m, z = self.n_states, self.n_obs, self.n_z
        if self.pi is None:
            self.pi = np.full(n, 1.0 / n)
        if self.A is None:
            self.A = np.full((z, n, n), 1.0 / n)
        if self.B is None:
            self.B = np.full((z, n, m), 1.0 / m)
        self.pi = _row_normalize(np.asarray(self.pi, dtype=np.float64))
        self.A = _row_normalize(np.asarray(self.A, dtype=np.float64))
        self.B = _row_normalize(np.asarray(self.B, dtype=np.float64))

    def randomize(self, seed: int | np.random.Generator = 0) -> "ConditionalHMM":
        g = _rng(seed)
        n, m, z = self.n_states, self.n_obs, self.n_z
        self.pi = g.dirichlet(np.ones(n))
        self.A = g.dirichlet(np.ones(n), size=(z, n))
        self.B = g.dirichlet(np.ones(m), size=(z, n))
        return self

    # -------------------------------------------------------------- forward

    def _check(self, obs: np.ndarray, zs: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
        obs = np.asarray(obs, dtype=np.int64)
        zs = np.asarray(zs, dtype=np.int64)
        if len(obs) != len(zs):
            raise ValueError("obs and z sequences must be the same length")
        if len(obs) == 0:
            raise ValueError("empty observation sequence")
        return obs, zs

    def forward(
        self, obs: np.ndarray, zs: np.ndarray
    ) -> tuple[np.ndarray, np.ndarray, float]:
        """Scaled forward pass conditioned on the z-sequence.

        The transition into step ``t`` uses ``A[z_{t-1}]`` — the consumer's
        next state is decided by the state of the producer of the item just
        browsed (the ``Z_{1,t'+1} -> U_{i,t}`` arrow in Fig. 3) — and the
        emission at ``t`` uses ``B[z_t]``.
        """
        obs, zs = self._check(obs, zs)
        T = len(obs)
        alpha = np.empty((T, self.n_states))
        scale = np.empty(T)
        a = self.pi * self.B[zs[0], :, obs[0]]
        scale[0] = max(a.sum(), _EPS)
        alpha[0] = a / scale[0]
        for t in range(1, T):
            a = (alpha[t - 1] @ self.A[zs[t - 1]]) * self.B[zs[t], :, obs[t]]
            scale[t] = max(a.sum(), _EPS)
            alpha[t] = a / scale[t]
        return alpha, scale, float(np.log(scale).sum())

    def backward(self, obs: np.ndarray, zs: np.ndarray, scale: np.ndarray) -> np.ndarray:
        obs, zs = self._check(obs, zs)
        T = len(obs)
        beta = np.empty((T, self.n_states))
        beta[-1] = 1.0
        for t in range(T - 2, -1, -1):
            beta[t] = (
                self.A[zs[t]] @ (self.B[zs[t + 1], :, obs[t + 1]] * beta[t + 1])
            ) / scale[t + 1]
        return beta

    def loglik(self, obs: np.ndarray, zs: np.ndarray) -> float:
        return self.forward(obs, zs)[2]

    # ------------------------------------------------------------------- EM

    def fit(
        self,
        sequences: list[tuple[np.ndarray, np.ndarray]],
        *,
        n_iter: int = 30,
        tol: float = 1e-4,
        seed: int | np.random.Generator = 0,
        init: bool = True,
        n_restarts: int = 3,
    ) -> "ConditionalHMM":
        """Baum-Welch over ``(obs, z)`` sequence pairs.

        Sufficient statistics are accumulated per conditioning value ``z``;
        ``(z, i)`` rows never visited keep a uniform fallback via
        ``_row_normalize`` so prediction on unseen producer states is
        well-defined. ``n_restarts`` seeded random starts guard against EM
        local optima (best training log-likelihood wins).
        """
        seqs = [self._check(o, z) for o, z in sequences if len(o) > 0]
        if not seqs:
            raise ValueError("no non-empty sequences to fit")
        if init and n_restarts > 1 and isinstance(seed, int):
            best = None
            for r in range(n_restarts):
                self.randomize(seed + 104729 * r)
                self.fit(seqs, n_iter=n_iter, tol=tol, init=False)
                ll = sum(self.loglik(o, z) for o, z in seqs)
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
            xi_acc = np.zeros((self.n_z, self.n_states, self.n_states))
            gb_acc = np.zeros((self.n_z, self.n_states, self.n_obs))
            total_ll = 0.0
            for obs, zs in seqs:
                alpha, scale, ll = self.forward(obs, zs)
                beta = self.backward(obs, zs, scale)
                total_ll += ll
                gamma = _row_normalize(alpha * beta)
                pi_acc += gamma[0]
                np.add.at(gb_acc, (zs, slice(None), obs), gamma)
                for t in range(len(obs) - 1):
                    xi = (
                        alpha[t][:, None]
                        * self.A[zs[t]]
                        * (self.B[zs[t + 1], :, obs[t + 1]] * beta[t + 1])[None, :]
                    ) / scale[t + 1]
                    xi_acc[zs[t]] += xi
            self.pi = _row_normalize(pi_acc)
            self.A = _row_normalize(xi_acc)
            self.B = _row_normalize(gb_acc)
            if total_ll - prev_ll < tol and np.isfinite(prev_ll):
                break
            prev_ll = total_ll
        return self

    # ------------------------------------------------------------ prediction

    def predict_next_dist(
        self, obs: np.ndarray, zs: np.ndarray, z_next: int | None = None
    ) -> np.ndarray:
        """``p(o_{T+1} | o_{1..T}, z_{1..T}, z_{T+1})``.

        ``z_next`` is the producer state governing the next interaction; when
        unknown (the recommendation-time case) the emission is averaged over
        the empirical transition ``A``-weighted continuation of ``z_T``,
        approximated by re-using ``z_T`` — the producer chain is slow-moving
        relative to consumption, which the tests validate is a good proxy.

        Filtering runs on prediction-smoothed matrices (see
        ``hmm.pred_smoothed``) so a window observation that the trained
        model assigns zero emission probability cannot collapse the state
        distribution.
        """
        from repro.core.hmm import pred_smoothed

        A, B = pred_smoothed(self.A, self.B)
        obs, zs = self._check(obs, zs)
        a = self.pi * B[zs[0], :, obs[0]]
        a = a / max(a.sum(), _EPS)
        for t in range(1, len(obs)):
            a = (a @ A[zs[t - 1]]) * B[zs[t], :, obs[t]]
            a = a / max(a.sum(), _EPS)
        zn = int(zs[-1]) if z_next is None else int(z_next)
        return (a @ A[zs[-1]]) @ B[zn]

    def predict_next(
        self, obs: np.ndarray, zs: np.ndarray, z_next: int | None = None
    ) -> int:
        return int(self.predict_next_dist(obs, zs, z_next).argmax())


def conditional_next_step_accuracy(
    model: ConditionalHMM, obs: np.ndarray, zs: np.ndarray, start: int
) -> float:
    """Held-out next-step accuracy for the conditional model (Fig. 5),
    single forward sweep. At step ``t`` the true ``z_t`` is available (the
    candidate item's producer state is known at scoring time, as in Eq. 1
    where the item ``v`` carries its producer)."""
    from repro.core.hmm import pred_smoothed

    obs = np.asarray(obs, dtype=np.int64)
    zs = np.asarray(zs, dtype=np.int64)
    if not 0 < start < len(obs):
        raise ValueError("start must split the sequence into non-empty parts")
    A, B = pred_smoothed(model.A, model.B)
    hits = 0
    a = model.pi * B[zs[0], :, obs[0]]
    a = a / max(a.sum(), _EPS)
    for t in range(1, len(obs)):
        pred = int(((a @ A[zs[t - 1]]) @ B[zs[t]]).argmax())
        if t >= start:
            hits += int(pred == obs[t])
        a = (a @ A[zs[t - 1]]) * B[zs[t], :, obs[t]]
        a = a / max(a.sum(), _EPS)
    return hits / (len(obs) - start)


def fit_best_conditional(
    obs: np.ndarray,
    zs: np.ndarray,
    n_obs: int,
    n_z: int,
    *,
    max_states: int = 8,
    train_frac: float = 0.8,
    seed: int = 0,
    n_iter: int = 25,
) -> tuple[ConditionalHMM, int, float]:
    """Per-user model selection for the b-HMM, mirroring ``fit_best_hmm``.

    The paper (§VI-C.1) tunes the optimal hidden-state number per user by
    held-out Accuracy, stopping once past the peak; the same protocol is
    applied to both layers' consumer models so the Fig. 5 comparison is
    symmetric. Returns ``(model, n_states, accuracy)``.
    """
    obs = np.asarray(obs, dtype=np.int64)
    zs = np.asarray(zs, dtype=np.int64)
    start = max(1, min(len(obs) - 1, int(round(len(obs) * train_frac))))
    best: tuple[ConditionalHMM, int, float] | None = None
    for n in range(1, max_states + 1):
        m = ConditionalHMM(n, n_obs, n_z).fit(
            [(obs[:start], zs[:start])], seed=seed + n, n_iter=n_iter
        )
        acc = conditional_next_step_accuracy(m, obs, zs, start)
        if best is None or acc > best[2]:
            best = (m, n, acc)
        elif acc < best[2]:
            break
    assert best is not None
    return best


@dataclass
class BiHMM:
    """The full two-layer model for one consumer population.

    ``fit_producers`` trains the shared a-HMM layer (one HMM per producer,
    all with ``n_z`` states) and exposes ``decode(producer, seq)``;
    ``fit_consumer`` trains one b-HMM per consumer on his ``(category,
    producer-state)`` trajectory. The heavy per-consumer work is designed to
    be called from Spark ``applyInPandas`` (see ``core/interest.py``).
    """

    n_categories: int
    n_z: int = 3
    n_states: int = 4
    producer_models: dict = field(default_factory=dict)

    def fit_producers(
        self, producer_seqs: dict[object, np.ndarray], *, seed: int = 0, n_iter: int = 25
    ) -> "BiHMM":
        """Train one a-HMM per producer on its item-category sequence."""
        for i, (p, seq) in enumerate(sorted(producer_seqs.items(), key=lambda kv: str(kv[0]))):
            m = DiscreteHMM(self.n_z, self.n_categories)
            m.fit(np.asarray(seq, dtype=np.int64), seed=seed + i, n_iter=n_iter)
            self.producer_models[p] = m
        return self

    def decode_producer(self, producer: object, seq: np.ndarray) -> np.ndarray:
        """Viterbi-decode a producer's item sequence to its Z states.

        Unknown producers decode to state 0 — the uniform-fallback
        conditioning bucket.
        """
        m = self.producer_models.get(producer)
        if m is None:
            return np.zeros(len(seq), dtype=np.int64)
        return m.viterbi(np.asarray(seq, dtype=np.int64))

    def fit_consumer(
        self, obs: np.ndarray, zs: np.ndarray, *, seed: int = 0, n_iter: int = 25
    ) -> ConditionalHMM:
        """Train the b-HMM for one consumer trajectory."""
        m = ConditionalHMM(self.n_states, self.n_categories, self.n_z)
        return m.fit([(obs, zs)], seed=seed, n_iter=n_iter)
