"""Table-7 comparators (offline stand-ins for ZeroER and DITTO).

The paper quotes published F1 numbers for ZeroER (unsupervised
matching) and DITTO (deep-learning matching). Neither system can run
offline, so two light-weight analogues exercise the same comparison
code path (classify candidate pairs, *without* the 1-1 bipartite
constraint — that is precisely what the paper's comparison probes):

* ``zeroer_lite`` — ZeroER's core idea without the full feature set:
  an unsupervised 2-component Gaussian mixture over the pair
  similarity, pairs assigned to the higher-mean component are matches.
* ``ditto_lite`` — a supervised stand-in: logistic regression over the
  similarity feature, trained on a labelled split (numpy gradient
  descent), evaluated on the held-out pairs.

Both consume a similarity graph's edge list and the ground truth and
return pair-classification F1 (pairs absent from the graph count as
predicted non-matches, and as missed matches if they are duplicates).
"""
from __future__ import annotations

import numpy as np

from ..core.metrics import PRF, prf_from_sets


def _f1_from_predictions(
    pred_mask: np.ndarray,
    v1: np.ndarray,
    v2: np.ndarray,
    truth: set[tuple[int, int]],
) -> PRF:
    predicted = {
        (int(a), int(b)) for a, b, m in zip(v1, v2, pred_mask) if m
    }
    return prf_from_sets(predicted, truth)


def zeroer_lite(
    v1: np.ndarray,
    v2: np.ndarray,
    w: np.ndarray,
    truth: set[tuple[int, int]],
    *,
    n_iter: int = 60,
    seed: int = 0,
) -> PRF:
    """Unsupervised GMM match/non-match classification of pairs."""
    w = np.asarray(w, dtype=np.float64)
    # EM for a 2-component 1-D Gaussian mixture, initialised from the
    # weight quantiles (non-match mass is the low mode).
    mu = np.array([np.quantile(w, 0.25), np.quantile(w, 0.99)])
    sigma = np.array([w.std() + 1e-3] * 2)
    pi = np.array([0.95, 0.05])
    for _ in range(n_iter):
        logp = (
            -0.5 * ((w[:, None] - mu[None, :]) / sigma[None, :]) ** 2
            - np.log(sigma[None, :])
            + np.log(pi[None, :])
        )
        logp -= logp.max(axis=1, keepdims=True)
        resp = np.exp(logp)
        resp /= resp.sum(axis=1, keepdims=True)
        nk = resp.sum(axis=0) + 1e-9
        mu = (resp * w[:, None]).sum(axis=0) / nk
        sigma = np.sqrt(
            (resp * (w[:, None] - mu[None, :]) ** 2).sum(axis=0) / nk
        ) + 1e-4
        pi = nk / len(w)
    match_comp = int(np.argmax(mu))
    is_match = resp[:, match_comp] > 0.5
    return _f1_from_predictions(is_match, v1, v2, truth)


def ditto_lite(
    v1: np.ndarray,
    v2: np.ndarray,
    w: np.ndarray,
    truth: set[tuple[int, int]],
    *,
    train_frac: float = 0.5,
    epochs: int = 400,
    lr: float = 2.0,
    seed: int = 0,
) -> PRF:
    """Supervised logistic regression over the similarity feature.

    Pairs are split into train/test; F1 is reported on the test half
    against the test half's ground truth (mirroring DITTO's use of a
    labelled training set).
    """
    rng = np.random.default_rng(seed)
    w = np.asarray(w, dtype=np.float64)
    y = np.array(
        [(int(a), int(b)) in truth for a, b in zip(v1, v2)], dtype=np.float64
    )
    is_train = rng.random(len(w)) < train_frac
    x = np.stack([w, np.ones_like(w)], axis=1)
    theta = np.zeros(2)
    xt, yt = x[is_train], y[is_train]
    # class weighting: matches are rare among all pairs
    pos = max(yt.sum(), 1.0)
    weight = np.where(yt > 0, len(yt) / (2 * pos), len(yt) / (2 * (len(yt) - pos)))
    for _ in range(epochs):
        p = 1.0 / (1.0 + np.exp(-xt @ theta))
        grad = (weight * (p - yt)) @ xt / len(yt)
        theta -= lr * grad
    p_test = 1.0 / (1.0 + np.exp(-x[~is_train] @ theta))
    test_truth = {
        (int(a), int(b))
        for a, b, m in zip(v1[~is_train], v2[~is_train], y[~is_train])
        if m
    }
    return _f1_from_predictions(
        p_test > 0.5, v1[~is_train], v2[~is_train], test_truth
    )
