"""Unit tests for Algorithm 1 (Next Record Set creation) and k-means."""
import numpy as np
import pytest

from repro.core.nrs import (
    elbow_k, kmeans, next_record_set, record_sets_for_block,
)
from repro.core.records import Record
from repro.embed.hashing import embed_text, tokens


def _rec(rid, text):
    return Record(rid=rid, text=text, vec=embed_text(text), tokens=tokens(text))


@pytest.fixture(scope="module")
def three_groups():
    """12 records in 3 textual groups of 4."""
    recs = []
    rid = 0
    for stem in ("alpha beta gamma", "delta epsilon zeta", "eta theta iota"):
        for k in range(4):
            recs.append(_rec(rid, f"{stem} item{k}"))
            rid += 1
    return recs


class TestKMeans:
    def test_labels_shape(self):
        vecs = np.random.default_rng(0).normal(size=(20, 8))
        labels, inertia = kmeans(vecs, 3, seed=0)
        assert labels.shape == (20,)
        assert set(labels) <= {0, 1, 2}
        assert inertia >= 0

    def test_k_equals_n(self):
        vecs = np.random.default_rng(0).normal(size=(4, 4))
        labels, inertia = kmeans(vecs, 4, seed=0)
        assert inertia == pytest.approx(0.0, abs=1e-9)

    def test_invalid_k(self):
        vecs = np.zeros((3, 2))
        with pytest.raises(ValueError):
            kmeans(vecs, 0)
        with pytest.raises(ValueError):
            kmeans(vecs, 4)

    def test_separable_clusters_found(self):
        g = np.random.default_rng(1)
        vecs = np.vstack(
            [g.normal(0, 0.05, (10, 3)), g.normal(5, 0.05, (10, 3))]
        )
        labels, _ = kmeans(vecs, 2, seed=0)
        assert len(set(labels[:10])) == 1
        assert len(set(labels[10:])) == 1
        assert labels[0] != labels[10]

    def test_deterministic(self):
        vecs = np.random.default_rng(2).normal(size=(15, 4))
        a = kmeans(vecs, 3, seed=7)
        b = kmeans(vecs, 3, seed=7)
        assert np.array_equal(a[0], b[0])


class TestElbow:
    def test_bounds(self):
        vecs = np.random.default_rng(0).normal(size=(30, 4))
        k = elbow_k(vecs, k_max=8)
        assert 2 <= k <= 8

    def test_tiny_input(self):
        assert elbow_k(np.zeros((2, 3))) in (1, 2)

    def test_clear_structure(self):
        g = np.random.default_rng(3)
        vecs = np.vstack(
            [g.normal(c * 10, 0.1, (12, 2)) for c in range(3)]
        )
        assert elbow_k(vecs, k_max=6) in (2, 3, 4)


class TestNextRecordSet:
    def test_small_remaining_takes_all(self, three_groups):
        few = three_groups[:5]
        rset, rest = next_record_set(few, s_s=9, s_d=4)
        assert {r.rid for r in rset} == {r.rid for r in few}
        assert rest == []

    def test_respects_set_size(self, three_groups):
        rset, rest = next_record_set(three_groups, s_s=9, s_d=4)
        assert len(rset) == 9
        assert len(rest) == 3

    def test_partition_no_overlap(self, three_groups):
        rset, rest = next_record_set(three_groups, s_s=9, s_d=4)
        assert {r.rid for r in rset} | {r.rid for r in rest} == {
            r.rid for r in three_groups
        }
        assert not ({r.rid for r in rset} & {r.rid for r in rest})

    def test_invalid_params(self, three_groups):
        with pytest.raises(ValueError):
            next_record_set(three_groups, s_s=1)
        with pytest.raises(ValueError):
            next_record_set(three_groups, s_s=9, s_d=0)

    def test_empty_remaining(self):
        assert next_record_set([], 9, 4) == ([], [])


class TestRecordSetsForBlock:
    def test_covers_block_exactly_once(self, three_groups):
        sets = record_sets_for_block(three_groups, 9, 4)
        flat = [r.rid for s in sets for r in s]
        assert sorted(flat) == sorted(r.rid for r in three_groups)

    def test_set_sizes(self, three_groups):
        sets = record_sets_for_block(three_groups, 5, 2)
        assert all(len(s) <= 5 for s in sets)

    def test_sequential_grouping_tendency(self, three_groups):
        # within a full set, similar (same-stem) records should mostly
        # sit next to one another after chain ordering
        sets = record_sets_for_block(three_groups, 9, 3, seed=1)
        big = max(sets, key=len)
        stems = [r.text.split()[0] for r in big]
        switches = sum(1 for i in range(len(stems) - 1) if stems[i] != stems[i + 1])
        assert switches <= len(set(stems)) + 1

    def test_single_record_block(self, three_groups):
        sets = record_sets_for_block(three_groups[:1], 9, 4)
        assert sets == [[three_groups[0]]]
