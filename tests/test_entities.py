"""Tests for the clean entity generators."""
import numpy as np
import pytest

from repro.er_data import entities as ent


@pytest.fixture
def rng():
    return np.random.default_rng(0)


class TestCitations:
    def test_schema(self, rng):
        df = ent.citations(rng, 20)
        assert list(df.columns) == ["title", "authors", "venue", "year"]

    def test_years_in_range(self, rng):
        years = ent.citations(rng, 50)["year"].astype(int)
        assert years.between(1990, 2017).all()

    def test_titles_mix_common_and_rare(self, rng):
        from repro.embeddings import lexicon as lx
        titles = " ".join(ent.citations(rng, 60)["title"])
        toks = set(titles.split())
        assert toks & set(lx.TOPIC_WORDS)
        assert toks & set(lx.RARE_TOPIC_WORDS)

    def test_authors_are_person_lists(self, rng):
        for a in ent.citations(rng, 20)["authors"]:
            for person in a.split(", "):
                assert len(person.split()) == 2


class TestProducts:
    def test_narrow_schema_5_attrs(self, rng):
        df = ent.products(rng, 10, n_attrs=5)
        assert len(df.columns) == 5

    def test_wide_schema_17_attrs(self, rng):
        df = ent.products(rng, 10, n_attrs=17)
        assert len(df.columns) == 17
        assert "sku" in df.columns and "model" in df.columns

    def test_title_contains_brand_and_model(self, rng):
        row = ent.products(rng, 1).iloc[0]
        toks = row["title"].split()
        assert toks[0] == row["manufacturer"]
        model = toks[-1]
        assert any(c.isdigit() for c in model)

    def test_prices_positive(self, rng):
        assert ent.products(rng, 30)["price"].astype(float).gt(0).all()


class TestRestaurants:
    def test_schema_7_attrs(self, rng):
        df = ent.restaurants(rng, 10)
        assert len(df.columns) == 7

    def test_phone_format(self, rng):
        for p in ent.restaurants(rng, 20)["phone"]:
            a, b, c = p.split("-")
            assert len(a) == 3 and len(b) == 3 and len(c) == 4

    def test_zipcode_is_oov_id(self, rng):
        """5-digit zipcodes are exactly the ID-like tokens the dictionary
        maps to UNK (the paper's OOV scenario)."""
        from repro.embeddings import glove840
        d = glove840()
        z = ent.restaurants(rng, 5)["zipcode"].iloc[0]
        assert z not in d


class TestModelNumbers:
    def test_in_vocab_for_big_dictionary(self, rng):
        """Short alnum model codes are in a Common-Crawl-sized dictionary
        (hash-vector identity), unlike long serial numbers."""
        from repro.embeddings import glove840
        d = glove840()
        assert ent._model_number(rng) in d
        assert "48291029" not in d
