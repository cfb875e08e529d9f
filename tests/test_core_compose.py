"""Tests for tuple composition (Algorithms 1 & 2 front half) and the
distributed DR computation."""
import numpy as np
import pandas as pd
import pytest

from repro.core.compose import (
    avg_attr_vector,
    avg_tuple_matrix,
    avg_tuple_vectors_spark,
    collect_vectors,
    encode_attr_tokens,
)
from repro.core.similarity import (
    abs_diff,
    hadamard,
    per_attribute_cosine,
    tuple_cosine,
)
from repro.embeddings import glove840
from repro.er_data import load, to_spark


class TestPaperRunningExample:
    """§2.3 Example 1: the Bill Gates / William Gates toy relation.

    With real GloVe the averaged name vectors are close and the city
    vectors identical; our dictionary reproduces exactly that structure.
    """

    def setup_method(self):
        self.d = glove840()
        self.t1 = {"name": "Bill Gates", "city": "Seattle"}
        self.t2 = {"name": "William Gates", "city": "Seattle"}

    def test_attr_vector_is_token_average(self):
        v = avg_attr_vector(self.d, "Bill Gates")
        np.testing.assert_allclose(
            v, (self.d.vector("bill") + self.d.vector("gates")) / 2)

    def test_same_city_identical_vectors(self):
        va = avg_attr_vector(self.d, self.t1["city"])
        vb = avg_attr_vector(self.d, self.t2["city"])
        np.testing.assert_allclose(va, vb)

    def test_similarity_vector_matches_example(self):
        """Example 3 analog: name cosine high (~0.99 in the paper's toy
        numbers), city cosine exactly 1."""
        table = pd.DataFrame([self.t1, self.t2])
        mat = avg_tuple_matrix(table, ["name", "city"], self.d)
        sim = per_attribute_cosine(mat[0:1], mat[1:2], 2, self.d.d)[0]
        assert sim[1] == pytest.approx(1.0)
        assert 0.5 < sim[0] < 1.0  # nickname makes names close, not equal

    def test_matching_pair_more_similar_than_random(self):
        t3 = {"name": "Cynthia Ortiz", "city": "Chicago"}
        table = pd.DataFrame([self.t1, self.t2, t3])
        mat = avg_tuple_matrix(table, ["name", "city"], self.d)
        assert tuple_cosine(mat[0], mat[1]) > tuple_cosine(mat[0], mat[2])


class TestAvgMatrix:
    def test_shape(self):
        ds = load("rest_fz", scale=0.1)
        d = glove840()
        mat = avg_tuple_matrix(ds.table_a, ds.attributes, d)
        assert mat.shape == (ds.n_a, len(ds.attributes) * d.d)

    def test_null_attr_gives_zero_block(self):
        d = glove840()
        table = pd.DataFrame([{"x": None, "y": "seattle"}])
        mat = avg_tuple_matrix(table, ["x", "y"], d)
        np.testing.assert_allclose(mat[0, :d.d], 0.0)  # UNK = zero vector
        assert np.abs(mat[0, d.d:]).sum() > 0

    def test_extra_vectors_used_for_oov(self):
        d = glove840()
        extra = {"00912345": np.ones(d.d)}
        table = pd.DataFrame([{"x": "00912345"}])
        with_extra = avg_tuple_matrix(table, ["x"], d, extra)
        without = avg_tuple_matrix(table, ["x"], d)
        np.testing.assert_allclose(with_extra[0], 1.0)
        np.testing.assert_allclose(without[0], 0.0)


class TestSimilarityOps:
    def test_abs_diff_and_hadamard(self):
        a = np.array([[1.0, -2.0]])
        b = np.array([[0.5, 1.0]])
        np.testing.assert_allclose(abs_diff(a, b), [[0.5, 3.0]])
        np.testing.assert_allclose(hadamard(a, b), [[0.5, -2.0]])

    def test_per_attribute_cosine_blockwise(self):
        # two attributes of 2 dims each: first identical, second opposite
        va = np.array([[1.0, 0.0, 0.0, 1.0]])
        vb = np.array([[1.0, 0.0, 0.0, -1.0]])
        sim = per_attribute_cosine(va, vb, 2, 2)
        np.testing.assert_allclose(sim, [[1.0, -1.0]], atol=1e-9)

    def test_zero_vector_cosine_is_zero(self):
        va = np.zeros((1, 4))
        vb = np.ones((1, 4))
        assert per_attribute_cosine(va, vb, 1, 4)[0, 0] == 0.0


class TestTokenEncoding:
    def test_shapes_and_mask(self):
        d = glove840()
        ds = load("pub_da", scale=0.05)
        index, _ = d.as_matrix(["database", "query"])
        ids, mask = encode_attr_tokens(ds.table_a, ds.attributes, index,
                                       max_len=6)
        assert ids.shape == (ds.n_a, len(ds.attributes), 6)
        assert mask.shape == ids.shape
        assert ((ids > 0) <= (mask > 0)).all()  # nonzero id => masked in

    def test_unknown_words_map_to_unk_row(self):
        ids, mask = encode_attr_tokens(pd.DataFrame([{"x": "zzz qqq"}]),
                                       ["x"], {"<unk>": 0}, max_len=4)
        assert ids[0, 0, 0] == 0 and mask[0, 0, 0] == 1.0

    def test_null_value_single_unk(self):
        ids, mask = encode_attr_tokens(pd.DataFrame([{"x": None}]), ["x"],
                                       {"<unk>": 0}, max_len=4)
        assert mask[0, 0].sum() == 1.0


class TestSparkCompose:
    def test_distributed_equals_driver(self, spark):
        """The mapInPandas DR computation must agree exactly with the
        driver-side path — same dictionary, rebuilt from its name."""
        ds = load("rest_fz", scale=0.3)
        df_a, _ = to_spark(spark, ds)
        d = glove840()
        want = avg_tuple_matrix(ds.table_a, ds.attributes, d)
        ids = ds.table_a["id"].tolist()
        got_ids, got = collect_vectors(
            avg_tuple_vectors_spark(df_a, ds.attributes, "glove840", d.d))
        order = [got_ids.index(i) for i in ids]
        np.testing.assert_allclose(got[order], want, atol=1e-12)
