"""Table-7 baseline stand-ins on separable synthetic similarity data."""
import numpy as np
import pytest

from repro.experiments.baselines import ditto_lite, zeroer_lite


def separable_pairs(n_match=60, n_non=600, seed=0):
    """Matches around 0.85, non-matches around 0.2."""
    rng = np.random.default_rng(seed)
    v1 = np.arange(n_match + n_non)
    v2 = np.arange(n_match + n_non)
    w = np.concatenate(
        [
            np.clip(0.85 + 0.05 * rng.standard_normal(n_match), 0, 1),
            np.clip(0.20 + 0.05 * rng.standard_normal(n_non), 0, 1),
        ]
    )
    truth = {(int(i), int(i)) for i in range(n_match)}
    return v1, v2, w, truth


class TestZeroerLite:
    def test_high_f1_on_separable_data(self):
        v1, v2, w, truth = separable_pairs()
        assert zeroer_lite(v1, v2, w, truth).f1 > 0.9

    def test_deterministic(self):
        v1, v2, w, truth = separable_pairs()
        assert zeroer_lite(v1, v2, w, truth) == zeroer_lite(v1, v2, w, truth)

    def test_degrades_on_overlapping_data(self):
        rng = np.random.default_rng(1)
        v1 = np.arange(400)
        v2 = np.arange(400)
        w = rng.random(400)  # no signal at all
        truth = {(int(i), int(i)) for i in range(40)}
        assert zeroer_lite(v1, v2, w, truth).f1 < 0.5


class TestDittoLite:
    def test_high_f1_on_separable_data(self):
        v1, v2, w, truth = separable_pairs()
        assert ditto_lite(v1, v2, w, truth).f1 > 0.9

    def test_seeded_split_deterministic(self):
        v1, v2, w, truth = separable_pairs()
        a = ditto_lite(v1, v2, w, truth, seed=4)
        b = ditto_lite(v1, v2, w, truth, seed=4)
        assert a == b

    def test_evaluates_on_test_half_only(self):
        v1, v2, w, truth = separable_pairs()
        r = ditto_lite(v1, v2, w, truth, train_frac=0.5)
        assert r.n_true < len(truth)  # test half's ground truth only
