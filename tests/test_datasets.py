"""Dataset generators: shapes, ground truth, relation/series consistency."""
import numpy as np
import pandas as pd
import pytest

from repro.core.precompute import series_matrix_pandas
from repro.datasets import covid_like, liquor_like, sp500_like, synthetic


class TestSynthetic:
    @pytest.mark.parametrize("seed", range(5))
    def test_shapes_and_gt(self, seed):
        sd = synthetic.generate(n=100, snr_db=35, seed=seed)
        assert sd.S.shape == (3, 100)
        assert sd.total.shape == (100,)
        assert 2 <= sd.gt_k <= 10
        assert all(0 < c < 99 for c in sd.gt_cuts)
        assert sd.gt_cuts == sorted(set(sd.gt_cuts))

    def test_nonnegative_integers(self):
        sd = synthetic.generate(n=100, snr_db=25, seed=1)
        assert (sd.S >= 0).all()
        np.testing.assert_array_equal(sd.S, np.round(sd.S))

    def test_total_is_category_sum(self):
        sd = synthetic.generate(seed=2)
        np.testing.assert_allclose(sd.total, sd.S.sum(axis=0))

    def test_snr_controls_noise(self):
        noisy = synthetic.generate(n=100, snr_db=20, seed=3)
        clean = synthetic.generate(n=100, snr_db=50, seed=3)
        # identical clean signal, larger deviation at lower SNR
        np.testing.assert_allclose(noisy.clean, clean.clean)
        dev_noisy = np.abs(noisy.S - noisy.clean).mean()
        dev_clean = np.abs(clean.S - clean.clean).mean()
        assert dev_noisy > dev_clean * 3

    def test_relation_sum_matches_series(self):
        sd = synthetic.generate(n=40, seed=4)
        sm = series_matrix_pandas(sd.relation_sum(), "T", ["category"], "sales")
        assert sm.epsilon == 3
        idx = {e: i for i, e in enumerate(sm.labels)}
        perm = [idx[e] for e in sd.labels]
        np.testing.assert_allclose(sm.S[perm], sd.S)
        np.testing.assert_allclose(sm.total, sd.total)

    def test_relation_count_matches_series(self):
        sd = synthetic.generate(n=20, seed=5)
        rel = sd.relation_count(scale=0.1)
        sm = series_matrix_pandas(rel, "T", ["category"], "sales", agg="count")
        idx = {e: i for i, e in enumerate(sm.labels)}
        perm = [idx[e] for e in sd.labels]
        np.testing.assert_allclose(sm.S[perm], np.round(sd.S * 0.1))

    def test_corpus_size(self):
        c = synthetic.corpus(n_datasets=2, snr_levels=(30.0, 40.0))
        assert len(c) == 4

    def test_deterministic(self):
        a = synthetic.generate(seed=9)
        b = synthetic.generate(seed=9)
        np.testing.assert_array_equal(a.S, b.S)
        assert a.gt_cuts == b.gt_cuts


class TestCovidLike:
    @pytest.fixture(scope="class")
    def cv(self):
        return covid_like.generate()

    def test_shapes(self, cv):
        assert cv.daily.shape == (10, 345)
        assert cv.n == 345
        assert len(cv.dates) == 345
        assert cv.gt_k == 7

    def test_total_is_cumsum(self, cv):
        np.testing.assert_allclose(cv.total, cv.daily.cumsum(axis=1))

    def test_nonnegative(self, cv):
        assert (cv.daily >= 0).all()

    def test_relation_consistent(self, cv):
        rel = cv.relation()
        assert len(rel) == 10 * 345
        sm = series_matrix_pandas(rel, "date", ["state"], "daily_confirmed")
        assert sm.epsilon == 10
        np.testing.assert_allclose(sm.total, cv.daily.sum(axis=0))

    def test_expected_top3_well_formed(self):
        assert len(covid_like.EXPECTED_TOP3) == 7
        for seg in covid_like.EXPECTED_TOP3:
            assert len(seg) == 3

    def test_scaled_n(self):
        small = covid_like.generate(n=120)
        assert small.n == 120
        assert all(0 < c < 119 for c in small.gt_cuts)


class TestSP500Like:
    @pytest.fixture(scope="class")
    def sp(self):
        return sp500_like.generate()

    def test_shapes(self, sp):
        assert sp.prices.shape[1] == 151
        assert sp.gt_k == 4
        assert len(sp.meta) == sp.prices.shape[0]

    def test_positive_prices(self, sp):
        assert (sp.prices > 0).all()

    def test_internet_retail_under_consumer_cyclical(self, sp):
        sub = sp.meta[sp.meta.subcategory == "internet_retail"]
        assert (sub.category == "consumer_cyclical").all()

    def test_relation_measure(self, sp):
        rel = sp.relation()
        rel["mv"] = rel["price"] * rel["share"]
        sm = series_matrix_pandas(rel, "date", ["category"], "mv", beta_max=1)
        assert sm.epsilon == sp.meta.category.nunique()
        vals, labels, total = sp.series()
        np.testing.assert_allclose(sm.total, total, rtol=1e-9)

    def test_stock_names_unique(self, sp):
        assert sp.meta.stock.is_unique


class TestLiquorLike:
    @pytest.fixture(scope="class")
    def lq(self):
        return liquor_like.generate(n=64, n_combos=120, seed=5)

    def test_shapes(self, lq):
        assert lq.n == 64
        assert lq.gt_k == 7
        rel = lq.relation()
        assert set(rel.columns) == {"date", "BV", "P", "CN", "VN", "bottles"}
        assert (rel["bottles"] > 0).all()

    def test_epsilon_scales_with_combos(self):
        small = liquor_like.generate(n=32, n_combos=60, seed=1)
        big = liquor_like.generate(n=32, n_combos=200, seed=1)
        sm_s = series_matrix_pandas(small.relation(), "date", list(small.attrs), "bottles")
        sm_b = series_matrix_pandas(big.relation(), "date", list(big.attrs), "bottles")
        assert sm_b.epsilon > sm_s.epsilon > 100

    def test_domain_values(self, lq):
        rel = lq.relation()
        assert set(rel.BV.unique()) <= set(liquor_like.BV_VALUES)
        assert set(rel.P.unique()) <= set(liquor_like.P_VALUES)

    def test_expected_table_shape(self):
        assert len(liquor_like.EXPECTED_TOP3) == 7
