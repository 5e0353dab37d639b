"""Tests for the pipeline record model and the ground-truth firewall."""
import numpy as np
import pytest

from repro.core.records import (
    Record, build_records, serialize_frame, strip_attr_labels,
)
from repro.datasets.generator import generate, serialize_row


class TestStripAttrLabels:
    def test_removes_labels(self):
        assert "t1:" not in strip_attr_labels("t1: foo | t2: bar")
        assert "foo" in strip_attr_labels("t1: foo")

    @pytest.mark.parametrize("label", ["t1:", "t12:", "n1:", "c1:"])
    def test_all_label_kinds(self, label):
        assert label not in strip_attr_labels(f"{label} value")

    def test_keeps_lookalike_words(self):
        # only [tnc]<digits>: patterns are labels
        assert "token:" in strip_attr_labels("token: value")


class TestRecord:
    def test_identity_by_rid(self):
        a = Record(rid=1, text="x", vec=np.zeros(4), tokens=frozenset())
        b = Record(rid=1, text="y", vec=np.ones(4), tokens=frozenset("y"))
        assert a == b and hash(a) == hash(b)

    def test_inequality(self):
        a = Record(rid=1, text="x", vec=np.zeros(4), tokens=frozenset())
        b = Record(rid=2, text="x", vec=np.zeros(4), tokens=frozenset())
        assert a != b

    def test_llm_token_estimate(self):
        r = Record(rid=0, text="x" * 40, vec=np.zeros(4), tokens=frozenset())
        assert r.n_tokens_llm == 10


class TestBuildRecords:
    def test_counts_and_truth(self, cora_small):
        sp, pdf, recs, truth = cora_small
        assert len(recs) == len(pdf) == len(truth)
        assert {r.rid for r in recs} == set(truth)

    def test_ground_truth_firewall(self, cora_small):
        """Pipeline-visible records must not expose the entity id."""
        _, _, recs, _ = cora_small
        r = recs[0]
        assert not hasattr(r, "entity_id")
        assert "entity_id" not in r.text

    def test_vectors_unit_norm(self, cora_small):
        _, _, recs, _ = cora_small
        norms = [float(np.linalg.norm(r.vec)) for r in recs[:20]]
        assert all(abs(n - 1.0) < 1e-4 for n in norms)

    def test_tokens_nonempty(self, cora_small):
        _, _, recs, _ = cora_small
        assert all(r.tokens for r in recs[:20])


class TestSerializeFrame:
    def test_matches_serialize_row(self, cora_small):
        sp, pdf, _, _ = cora_small
        texts = serialize_frame(pdf, sp)
        for i in range(0, len(pdf), max(1, len(pdf) // 10)):
            assert texts[i] == serialize_row(pdf.iloc[i], sp.attrs)

    def test_mixed_attrs_match(self, wa_small):
        sp, pdf, _, _ = wa_small
        texts = serialize_frame(pdf, sp)
        for i in (0, len(pdf) // 2, len(pdf) - 1):
            assert texts[i] == serialize_row(pdf.iloc[i], sp.attrs)
