"""Unit tests for the dirty-ER record generator."""
from dataclasses import replace

import numpy as np
import pandas as pd
import pytest

from repro.datasets.generator import (
    _corrupt_text, _duplicate_counts, _typo, generate, serialize_row,
)
from repro.datasets.registry import spec as get_spec
from repro.datasets.schema import DatasetSpec, mixed, textual
from repro.embed.hashing import tokens
from repro.embed.similarity import jaccard


@pytest.fixture(scope="module")
def small_spec():
    return DatasetSpec(
        name="g", domain="d", n_records=200, n_entities=40,
        attrs=mixed(2, 1, 1), noise=0.3, confusability=0.3, seed=5,
    )


@pytest.fixture(scope="module")
def frame(small_spec):
    return generate(small_spec)


class TestGenerate:
    def test_row_count(self, small_spec, frame):
        assert len(frame) == small_spec.n_records

    def test_every_entity_present(self, small_spec, frame):
        assert frame["entity_id"].nunique() == small_spec.n_entities

    def test_record_ids_dense(self, frame):
        assert sorted(frame["record_id"]) == list(range(len(frame)))

    def test_attr_columns_present(self, small_spec, frame):
        for a in small_spec.attrs:
            assert a.name in frame.columns

    def test_deterministic(self, small_spec):
        a, b = generate(small_spec), generate(small_spec)
        pd.testing.assert_frame_equal(a, b)

    def test_seed_changes_data(self, small_spec):
        other = generate(replace(small_spec, seed=6))
        assert not generate(small_spec).equals(other)

    def test_shuffled_rows_carry_no_order_signal(self, frame):
        # consecutive records should not be the same entity much more
        # often than chance would allow after shuffling
        ent = frame["entity_id"].to_numpy()
        adjacent_same = np.mean(ent[:-1] == ent[1:])
        assert adjacent_same < 0.3

    def test_textual_values_nonempty_title(self, frame):
        assert (frame["t1"].str.len() > 0).all()


class TestNoiseEffect:
    def test_more_noise_less_duplicate_overlap(self):
        base = DatasetSpec(
            name="n", domain="d", n_records=300, n_entities=50,
            attrs=textual(3), seed=9,
        )

        def mean_dup_jaccard(noise):
            pdf = generate(replace(base, noise=noise))
            sims = []
            for _, grp in pdf.groupby("entity_id"):
                rows = list(grp.itertuples())[:3]
                for i in range(len(rows)):
                    for k in range(i + 1, len(rows)):
                        sims.append(
                            jaccard(tokens(rows[i].t1), tokens(rows[k].t1))
                        )
            return np.mean(sims)

        assert mean_dup_jaccard(0.1) > mean_dup_jaccard(0.7) + 0.1

    def test_confusability_creates_family_overlap(self):
        base = DatasetSpec(
            name="c", domain="d", n_records=200, n_entities=100,
            attrs=textual(1), noise=0.0, seed=4,
        )

        def cross_entity_overlap(conf):
            pdf = generate(replace(base, confusability=conf))
            canon = pdf.groupby("entity_id").first()
            sims = [
                jaccard(tokens(canon.t1.iloc[i]), tokens(canon.t1.iloc[i + 1]))
                for i in range(0, 80, 2)
            ]
            return np.mean(sims)

        assert cross_entity_overlap(0.8) > cross_entity_overlap(0.0) + 0.1


class TestValueMisplacement:
    def test_misplacement_moves_categorical_into_title(self):
        sp = DatasetSpec(
            name="vm", domain="d", n_records=300, n_entities=60,
            attrs=mixed(1, 0, 1), noise=0.0, value_misplacement=1.0, seed=3,
        )
        pdf = generate(sp)
        leaked = pdf["t1"].str.startswith("cat_").mean()
        assert leaked > 0.9

    def test_no_misplacement_by_default(self):
        sp = DatasetSpec(
            name="vm0", domain="d", n_records=100, n_entities=20,
            attrs=mixed(1, 0, 1), noise=0.0, seed=3,
        )
        pdf = generate(sp)
        assert pdf["t1"].str.startswith("cat_").mean() == 0.0


class TestCorruptionOps:
    def test_typo_changes_word(self):
        g = np.random.default_rng(0)
        changed = sum(_typo("konstantin", g) != "konstantin" for _ in range(50))
        assert changed > 30

    def test_typo_short_word_safe(self):
        g = np.random.default_rng(0)
        assert _typo("a", g) == "a"

    def test_corrupt_text_zero_noise_identity(self):
        g = np.random.default_rng(0)
        assert _corrupt_text("alpha beta gamma", 0.0, g) == "alpha beta gamma"

    def test_corrupt_text_never_empty(self):
        g = np.random.default_rng(1)
        for _ in range(50):
            assert _corrupt_text("word", 1.0, g) != ""

    def test_duplicate_counts_sum(self, small_spec):
        g = np.random.default_rng(0)
        counts = _duplicate_counts(small_spec, g)
        assert counts.sum() == small_spec.n_records
        assert counts.min() >= 1


class TestSerializeRow:
    def test_includes_all_attrs(self, small_spec, frame):
        s = serialize_row(frame.iloc[0], small_spec.attrs)
        for a in small_spec.attrs:
            assert f"{a.name}:" in s

    def test_nan_numeric_serialized_empty(self):
        attrs = mixed(1, 1, 0)
        row = {"t1": "x", "n1": float("nan")}
        assert serialize_row(row, attrs).endswith("n1: ")

    def test_numeric_formatting_no_trailing_zeros(self):
        attrs = mixed(1, 1, 0)
        row = {"t1": "x", "n1": 12.0}
        assert "n1: 12" in serialize_row(row, attrs)


class TestScaledRegistryGeneration:
    @pytest.mark.parametrize("name", ["cora", "wa", "as"])
    def test_scaled_generation_matches_spec(self, name):
        sp = get_spec(name, 0.05)
        pdf = generate(sp)
        assert len(pdf) == sp.n_records
        assert pdf["entity_id"].nunique() == sp.n_entities
