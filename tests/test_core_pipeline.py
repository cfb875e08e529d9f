"""Tests for pair sampling, K-fold CV, the DeepER pipeline, and the
baseline — the machinery behind every evaluation table."""
import numpy as np
import pytest

from repro.baselines import (
    MagellanLite,
    exact_match,
    jaccard_tokens,
    jaccard_trigrams,
    levenshtein_sim,
    numeric_sim,
)
from repro.baselines.simfns import levenshtein
from repro.core import DeepERConfig, evaluate_deeper, evaluate_magellan
from repro.core.compose import avg_tuple_matrix
from repro.core.pairs import f1_score, kfold_indices, sample_pairs
from repro.embeddings import glove840
from repro.er_data import load


class TestSimilarityFunctions:
    def test_jaccard_tokens(self):
        assert jaccard_tokens("a b c", "a b d") == pytest.approx(2 / 4)
        assert jaccard_tokens("", "") == 0.0
        assert jaccard_tokens("A b", "a B") == 1.0  # case-insensitive

    def test_jaccard_trigrams_typo_robust(self):
        assert jaccard_trigrams("seattle", "seattel") > \
            jaccard_trigrams("seattle", "chicago")

    def test_levenshtein_basics(self):
        assert levenshtein("abc", "abc") == 0
        assert levenshtein("abc", "abd") == 1
        assert levenshtein("", "xyz") == 3
        assert levenshtein("kitten", "sitting") == 3

    def test_levenshtein_sim_range(self):
        assert levenshtein_sim("hello", "hello") == 1.0
        assert 0.0 <= levenshtein_sim("hello", "world") < 1.0
        assert levenshtein_sim(None, None) == 0.0

    def test_exact_match(self):
        assert exact_match("VLDB 2018", "vldb 2018") == 1.0
        assert exact_match("a", "b") == 0.0
        assert exact_match("", "") == 0.0

    def test_numeric_sim(self):
        assert numeric_sim("99.99", "99.99") == 1.0
        assert numeric_sim("100", "50") == pytest.approx(0.5)
        assert numeric_sim("abc", "100") == 0.0


class TestF1:
    def test_perfect(self):
        y = np.array([1.0, 0.0, 1.0])
        assert f1_score(y, y) == (1.0, 1.0, 1.0)

    def test_no_predictions(self):
        assert f1_score(np.array([1.0, 0.0]), np.array([0.0, 0.0]))[0] == 0.0

    def test_half_precision(self):
        y = np.array([1.0, 0.0])
        p = np.array([1.0, 1.0])
        f1, prec, rec = f1_score(y, p)
        assert prec == 0.5 and rec == 1.0


class TestKFold:
    def test_partition_properties(self):
        y = np.array([1.0] * 10 + [0.0] * 50)
        folds = kfold_indices(60, 3, seed=0, labels=y)
        seen = []
        for tr, te in folds:
            assert set(tr) | set(te) == set(range(60))
            assert not set(tr) & set(te)
            seen.extend(te.tolist())
        assert sorted(seen) == list(range(60))

    def test_stratification(self):
        y = np.array([1.0] * 9 + [0.0] * 81)
        for _, te in kfold_indices(90, 3, seed=1, labels=y):
            assert np.sum(y[te]) == 3  # each fold gets its share of positives


class TestPairSampling:
    @pytest.fixture(scope="class")
    def sampled(self):
        ds = load("rest_fz", scale=0.5)
        d = glove840()
        va = avg_tuple_matrix(ds.table_a, ds.attributes, d)
        vb = avg_tuple_matrix(ds.table_b, ds.attributes, d)
        ids_a = ds.table_a["id"].tolist()
        ids_b = ds.table_b["id"].tolist()
        pairs, y, thr = sample_pairs(ds, va, vb, ids_a, ids_b,
                                     neg_ratio=5, seed=0)
        return ds, pairs, y, thr

    def test_all_matches_are_positives(self, sampled):
        ds, pairs, y, _ = sampled
        pos = {p for p, lab in zip(pairs, y) if lab == 1.0}
        assert pos == ds.matches

    def test_negatives_are_nonmatches(self, sampled):
        ds, pairs, y, _ = sampled
        for p, lab in zip(pairs, y):
            if lab == 0.0:
                assert p not in ds.matches

    def test_ratio_approximate(self, sampled):
        ds, pairs, y, _ = sampled
        n_pos = int(y.sum())
        n_neg = len(y) - n_pos
        assert 3 * n_pos <= n_neg <= 5 * n_pos

    def test_no_duplicate_pairs(self, sampled):
        _, pairs, _, _ = sampled
        assert len(pairs) == len(set(pairs))

    def test_deterministic(self):
        ds = load("rest_fz", scale=0.3)
        d = glove840()
        va = avg_tuple_matrix(ds.table_a, ds.attributes, d)
        vb = avg_tuple_matrix(ds.table_b, ds.attributes, d)
        ia, ib = ds.table_a["id"].tolist(), ds.table_b["id"].tolist()
        r1 = sample_pairs(ds, va, vb, ia, ib, neg_ratio=4, seed=2)
        r2 = sample_pairs(ds, va, vb, ia, ib, neg_ratio=4, seed=2)
        assert r1[0] == r2[0]
        np.testing.assert_array_equal(r1[1], r2[1])


class TestMagellanLite:
    def test_learns_separable(self):
        rng = np.random.default_rng(0)
        X = rng.random((200, 10))
        y = (X[:, 0] + X[:, 3] > 1.0).astype(float)
        model = MagellanLite(10, epochs=60, seed=0).fit(X, y)
        f1, _, _ = f1_score(y, model.predict(X))
        assert f1 > 0.9


SMALL = DeepERConfig(folds=2, neg_ratio=4, d=32, epochs=12)


class TestPipelineEndToEnd:
    def test_deeper_easy_dataset_high_f1(self):
        r = evaluate_deeper(load("rest_fz", scale=0.5), SMALL)
        assert r["f1"] > 0.9
        assert set(r) >= {"f1", "precision", "recall", "per_fold"}
        assert len(r["per_fold"]) == 2

    def test_magellan_easy_dataset_high_f1(self):
        r = evaluate_magellan(load("rest_fz", scale=0.5), SMALL)
        assert r["f1"] > 0.9

    def test_deeper_beats_magellan_on_challenging_products(self):
        """The paper's headline claim (Table 4) at test scale."""
        ds = load("prod_ag", scale=0.5)
        cfg = DeepERConfig(folds=2, neg_ratio=10, d=64)
        assert evaluate_deeper(ds, cfg)["f1"] > \
            evaluate_magellan(ds, cfg)["f1"] - 0.01

    def test_lstm_composition_runs(self):
        from dataclasses import replace
        r = evaluate_deeper(load("rest_fz", scale=0.2),
                            replace(SMALL, composition="lstm", epochs=6))
        assert 0.0 <= r["f1"] <= 1.0

    def test_end_to_end_embedding_update_runs(self):
        from dataclasses import replace
        r = evaluate_deeper(load("rest_fz", scale=0.2),
                            replace(SMALL, update_embeddings=True, epochs=6))
        assert r["f1"] > 0.7

    def test_retrofit_config_runs(self):
        from dataclasses import replace
        r = evaluate_deeper(load("rest_fz", scale=0.2),
                            replace(SMALL, use_retrofit=True, epochs=6))
        assert r["f1"] > 0.7

    def test_unknown_composition_raises(self):
        from dataclasses import replace
        with pytest.raises(ValueError):
            evaluate_deeper(load("rest_fz", scale=0.1),
                            replace(SMALL, composition="transformer"))
