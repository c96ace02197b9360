"""The generative model: Table I MLEs, EM recovery, Spark/numpy agreement."""
import math

import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.em import (
    DEFAULT_DISTS,
    EMParams,
    FeatureParams,
    _mstep,
    _mstep_moments,
    fit_em,
    fit_em_spark,
    loglik_and_resp,
    score_array,
    score_column,
)
from repro.core.gammas import GAMMA_NAMES


class TestTableIMLEs:
    """The M-step formulas from Table I with known responsibilities."""

    def test_gaussian_matched(self):
        x = np.array([1.0, 2.0, 3.0, 10.0])
        r = np.array([1.0, 1.0, 1.0, 0.0])  # last sample is unmatched
        m = _mstep_moments(
            "gaussian", sr=r.sum(), srx=(r * x).sum(), srxx=(r * x * x).sum()
        )
        assert m["mu"] == pytest.approx(2.0)
        assert m["var"] == pytest.approx(2.0 / 3.0)

    def test_gaussian_unmatched_complement(self):
        x = np.array([1.0, 2.0, 3.0, 10.0])
        r = np.array([1.0, 1.0, 1.0, 0.0])
        u = 1 - r
        m = _mstep_moments(
            "gaussian", sr=u.sum(), srx=(u * x).sum(), srxx=(u * x * x).sum()
        )
        assert m["mu"] == pytest.approx(10.0)

    def test_exponential_lambda_is_inverse_mean(self):
        x = np.array([0.5, 1.5, 2.0])
        r = np.ones(3)
        m = _mstep_moments("exponential", sr=3.0, srx=float(x.sum()), srxx=0.0)
        assert m["lam"] == pytest.approx(3.0 / 4.0)

    def test_multinomial_probs(self):
        cats = {0.0: 3.0, 1.0: 1.0}
        m = _mstep_moments("multinomial", sr=4.0, srx=0, srxx=0, cats=cats)
        assert m["probs"][0.0] == pytest.approx(0.75)
        assert m["probs"][1.0] == pytest.approx(0.25)

    @given(st.lists(st.floats(0.01, 5.0), min_size=3, max_size=40))
    @settings(max_examples=40, deadline=None)
    def test_exponential_mle_property(self, xs):
        x = np.array(xs)
        m = _mstep_moments("exponential", sr=float(len(x)), srx=float(x.sum()), srxx=0.0)
        assert m["lam"] == pytest.approx(min(len(x) / x.sum(), 20.0))

    def test_fractional_responsibilities(self):
        """Table I with soft l_j: weighted means."""
        x = np.array([0.0, 4.0])
        r = np.array([0.25, 0.75])
        m = _mstep_moments("gaussian", sr=1.0, srx=3.0, srxx=12.0)
        assert m["mu"] == pytest.approx(3.0)


class TestEMRecovery:
    def _two_component(self, dist, n=4000, seed=0):
        rng = np.random.default_rng(seed)
        z = rng.random(n) < 0.3
        if dist == "gaussian":
            x = np.where(z, rng.normal(2.0, 0.3, n), rng.normal(0.0, 0.3, n))
        elif dist == "exponential":
            x = np.where(z, rng.exponential(2.0, n), rng.exponential(0.1, n))
        else:
            x = np.where(z, rng.random(n) < 0.9, rng.random(n) < 0.1).astype(float)
        return x.reshape(-1, 1), z

    def test_recovers_gaussian_mixture(self):
        X, z = self._two_component("gaussian")
        p = fit_em(X, feats=["f"], dists={"f": "gaussian"}, seed=1)
        assert p.p == pytest.approx(0.3, abs=0.05)
        assert p.features["f"].matched["mu"] == pytest.approx(2.0, abs=0.1)
        assert p.features["f"].unmatched["mu"] == pytest.approx(0.0, abs=0.1)

    def test_recovers_exponential_mixture(self):
        X, z = self._two_component("exponential")
        p = fit_em(X, feats=["f"], dists={"f": "exponential"}, seed=1)
        assert 1 / p.features["f"].matched["lam"] == pytest.approx(2.0, abs=0.5)
        assert p.features["f"].unmatched["lam"] > p.features["f"].matched["lam"]

    def test_recovers_multinomial_mixture(self):
        X, z = self._two_component("multinomial")
        p = fit_em(X, feats=["f"], dists={"f": "multinomial"}, seed=1)
        assert p.features["f"].matched["probs"][1.0] > 0.7
        assert p.features["f"].unmatched["probs"][1.0] < 0.3

    def test_responsibilities_separate_components(self):
        X, z = self._two_component("gaussian")
        p = fit_em(X, feats=["f"], dists={"f": "gaussian"}, seed=1)
        _, resp = loglik_and_resp(X, ["f"], p)
        acc = ((resp > 0.5) == z).mean()
        assert acc > 0.95

    def test_loglik_monotone_nondecreasing(self):
        """EM's defining property on the actual fit trajectory."""
        X, _ = self._two_component("gaussian", n=500)
        lls = []
        for it in range(1, 8):
            p = fit_em(X, feats=["f"], dists={"f": "gaussian"}, n_iter=it, seed=1, tol=0.0)
            lls.append(p.loglik)
        assert all(b >= a - 1e-6 for a, b in zip(lls, lls[1:]))

    def test_matched_is_high_similarity_component(self):
        """Orientation: regardless of init, 'matched' means larger means."""
        X, _ = self._two_component("gaussian")
        for seed in range(3):
            p = fit_em(X, feats=["f"], dists={"f": "gaussian"}, seed=seed)
            assert p.features["f"].matched["mu"] > p.features["f"].unmatched["mu"]

    def test_six_feature_fit_runs(self):
        rng = np.random.default_rng(0)
        n = 500
        z = rng.random(n) < 0.2
        X = np.stack(
            [
                np.where(z, rng.normal(0.8, 0.1, n), rng.normal(0.2, 0.1, n)),
                np.where(z, rng.exponential(1.0, n), rng.exponential(0.05, n)),
                np.where(z, rng.normal(0.7, 0.1, n), rng.normal(0.4, 0.1, n)),
                np.where(z, rng.exponential(0.5, n), rng.exponential(0.02, n)),
                np.where(z, rng.exponential(2.0, n), rng.exponential(0.1, n)),
                np.where(z, rng.exponential(0.3, n), rng.exponential(0.03, n)),
            ],
            axis=1,
        )
        p = fit_em(X, seed=0)
        scores = score_array(X, p)
        assert ((scores > 0) == z).mean() > 0.9


class TestScoring:
    def _params(self):
        return EMParams(
            p=0.2,
            features={
                "f1": FeatureParams("gaussian", {"mu": 1.0, "var": 0.1}, {"mu": 0.0, "var": 0.1}),
                "f2": FeatureParams("exponential", {"lam": 0.5}, {"lam": 5.0}),
            },
        )

    def test_score_formula_by_hand(self):
        p = self._params()
        x = np.array([[1.0, 2.0]])
        lm = math.log(0.2) - 0.5 * math.log(2 * math.pi * 0.1) - 0.0 + math.log(0.5) - 1.0
        lu = math.log(0.8) - 0.5 * math.log(2 * math.pi * 0.1) - 5.0 + math.log(5.0) - 10.0
        assert score_array(x, p, feats=["f1", "f2"])[0] == pytest.approx(lm - lu)

    def test_higher_similarity_higher_score(self):
        p = self._params()
        lo = score_array(np.array([[0.1, 0.1]]), p, feats=["f1", "f2"])[0]
        hi = score_array(np.array([[0.9, 1.5]]), p, feats=["f1", "f2"])[0]
        assert hi > lo

    @pytest.mark.spark
    def test_score_column_matches_numpy(self, spark):
        rng = np.random.default_rng(0)
        X = np.abs(rng.normal(0.5, 0.5, size=(200, 6)))
        pdf = pd.DataFrame(X, columns=list(GAMMA_NAMES))
        params = fit_em(X, seed=0)
        got = (
            spark.createDataFrame(pdf)
            .withColumn("score", score_column(params))
            .toPandas()["score"]
            .to_numpy()
        )
        np.testing.assert_allclose(got, score_array(X, params), rtol=1e-8)

    @pytest.mark.spark
    def test_multinomial_score_column_matches_numpy(self, spark):
        rng = np.random.default_rng(0)
        X = rng.integers(0, 3, size=(100, 1)).astype(float)
        params = fit_em(X, feats=["f"], dists={"f": "multinomial"}, seed=0)
        pdf = pd.DataFrame({"f": X[:, 0]})
        got = (
            spark.createDataFrame(pdf)
            .withColumn("score", score_column(params, feats=["f"]))
            .toPandas()["score"]
            .to_numpy()
        )
        np.testing.assert_allclose(got, score_array(X, params, feats=["f"]), rtol=1e-8)


@pytest.mark.spark
class TestSparkEM:
    def test_spark_em_close_to_numpy(self, spark):
        rng = np.random.default_rng(0)
        n = 2000
        z = rng.random(n) < 0.3
        X = np.stack(
            [
                np.where(z, rng.normal(0.8, 0.1, n), rng.normal(0.2, 0.1, n)),
                np.where(z, rng.exponential(1.0, n), rng.exponential(0.05, n)),
            ],
            axis=1,
        )
        pdf = pd.DataFrame(X, columns=["a", "b"])
        p_np = fit_em(X, feats=["a", "b"], dists={"a": "gaussian", "b": "exponential"}, seed=0)
        p_sp = fit_em_spark(
            spark.createDataFrame(pdf),
            feats=["a", "b"],
            dists={"a": "gaussian", "b": "exponential"},
        )
        assert p_sp.p == pytest.approx(p_np.p, abs=0.05)
        assert p_sp.features["a"].matched["mu"] == pytest.approx(
            p_np.features["a"].matched["mu"], abs=0.05
        )
        assert p_sp.features["b"].matched["lam"] == pytest.approx(
            p_np.features["b"].matched["lam"], rel=0.2
        )

    def test_spark_em_rejects_multinomial(self, spark):
        pdf = pd.DataFrame({"a": [0.0, 1.0, 0.0]})
        with pytest.raises(ValueError):
            fit_em_spark(spark.createDataFrame(pdf), feats=["a"], dists={"a": "multinomial"})


class TestDefaults:
    def test_default_dists_cover_gammas(self):
        assert set(DEFAULT_DISTS) == set(GAMMA_NAMES)

    def test_mstep_on_empty_group_does_not_crash(self):
        X = np.array([[0.5], [0.6]])
        r = np.zeros(2)
        params = _mstep(X, ["f"], {"f": "gaussian"}, r)
        assert np.isfinite(params.features["f"].matched["mu"])
