"""Unit tests for Algorithm 2 (MDG) and record-set regeneration."""
import numpy as np
import pytest

from repro.core.mdg import (
    _repair, cluster_with_guardrail, mdg_accepts, misclustered,
    regenerate_order, structurally_valid,
)
from repro.core.records import Record
from repro.embed.hashing import embed_text, tokens
from repro.llm.profiles import GPT_4O_MINI
from repro.llm.simulated import SimulatedLLM


def _rec(rid, text):
    return Record(rid=rid, text=text, vec=embed_text(text), tokens=tokens(text))


@pytest.fixture()
def two_entities():
    """Two clearly separated entities, 3 records each."""
    a = [_rec(i, f"apple orchard harvest fruit v{i}") for i in range(3)]
    b = [_rec(i + 3, f"neutron star collapse physics v{i}") for i in range(3)]
    return a, b


class TestStructurallyValid:
    def test_valid_partition(self, two_entities):
        a, b = two_entities
        assert structurally_valid(a + b, [a, b])

    def test_dropped_record(self, two_entities):
        a, b = two_entities
        assert not structurally_valid(a + b, [a, b[:-1]])

    def test_duplicated_record(self, two_entities):
        a, b = two_entities
        assert not structurally_valid(a + b, [a, b + [a[0]]])

    def test_foreign_record(self, two_entities):
        a, b = two_entities
        ghost = _rec(99, "ghost record")
        assert not structurally_valid(a + b, [a, b[:-1] + [ghost]])


class TestMisclustered:
    def test_correct_clustering_clean(self, two_entities):
        a, b = two_entities
        assert misclustered([a, b]) == []

    def test_wrong_assignment_flagged(self, two_entities):
        a, b = two_entities
        wrong = [a[:2] + [b[0]], b[1:] + [a[2]]]
        flagged = {r.rid for r in misclustered(wrong)}
        assert b[0].rid in flagged or a[2].rid in flagged

    def test_merge_all_garble_flagged_by_floor(self, two_entities):
        a, b = two_entities
        # a hallucinated merge-everything output has no other cluster
        # for the relative rule — the absolute floor must catch it
        assert misclustered([a + b]) != []

    def test_margin_suppresses_ties(self, two_entities):
        a, b = two_entities
        # at an enormous margin nothing is ever flagged relatively,
        # but the absolute floor still fires on garbled merges
        assert misclustered([a, b], margin=10.0) == []

    def test_singletons_skipped(self, two_entities):
        a, b = two_entities
        clusters = [[r] for r in a + b]
        assert misclustered(clusters) == []

    def test_small_input(self, two_entities):
        a, _ = two_entities
        assert misclustered([[a[0]]]) == []


class TestMdgAccepts:
    def test_good(self, two_entities):
        a, b = two_entities
        assert mdg_accepts(a + b, [a, b])

    def test_structural_reject(self, two_entities):
        a, b = two_entities
        assert not mdg_accepts(a + b, [a])

    def test_similarity_reject(self, two_entities):
        a, b = two_entities
        assert not mdg_accepts(a + b, [a[:1] + b[:1], a[1:] + b[1:]])


class TestRegenerateOrder:
    def test_moves_bad_record_next_to_best_cluster(self, two_entities):
        a, b = two_entities
        wrong = [a[:2], b + [a[2]]]  # a[2] stuck in the physics cluster
        order = regenerate_order(wrong, [a[2]])
        ids = [r.rid for r in order]
        # a[2] must now sit adjacent to another apple record
        pos = ids.index(a[2].rid)
        neighbours = {ids[max(0, pos - 1)], ids[min(len(ids) - 1, pos + 1)]}
        assert neighbours & {r.rid for r in a[:2]}

    def test_preserves_membership(self, two_entities):
        a, b = two_entities
        wrong = [a[:2], b + [a[2]]]
        order = regenerate_order(wrong, [a[2]])
        assert sorted(r.rid for r in order) == sorted(r.rid for r in a + b)


class TestRepair:
    def test_restores_dropped(self, two_entities):
        a, b = two_entities
        out = _repair(a + b, [a])  # b entirely dropped
        flat = sorted(r.rid for c in out for r in c)
        assert flat == sorted(r.rid for r in a + b)

    def test_dedupes(self, two_entities):
        a, b = two_entities
        out = _repair(a + b, [a, b + [a[0]]])
        flat = [r.rid for c in out for r in c]
        assert len(flat) == len(set(flat))


class TestClusterWithGuardrail:
    def test_output_is_partition(self, two_entities):
        a, b = two_entities
        truth = {r.rid: 0 for r in a} | {r.rid: 1 for r in b}
        llm = SimulatedLLM(truth, GPT_4O_MINI, seed=0)
        clusters = cluster_with_guardrail(llm, a + b)
        flat = sorted(r.rid for c in clusters for r in c)
        assert flat == sorted(truth)

    def test_easy_case_is_correct(self, two_entities):
        a, b = two_entities
        truth = {r.rid: 0 for r in a} | {r.rid: 1 for r in b}
        llm = SimulatedLLM(truth, GPT_4O_MINI, seed=0)
        clusters = cluster_with_guardrail(llm, a + b)
        for c in clusters:
            assert len({truth[r.rid] for r in c}) == 1

    def test_no_mdg_mode_still_partition(self, two_entities):
        a, b = two_entities
        truth = {r.rid: 0 for r in a} | {r.rid: 1 for r in b}
        for seed in range(8):  # across seeds incl. hallucinating draws
            llm = SimulatedLLM(truth, GPT_4O_MINI, seed=seed)
            clusters = cluster_with_guardrail(llm, a + b, use_mdg=False)
            flat = [r.rid for c in clusters for r in c]
            assert sorted(flat) == sorted(truth)
            assert len(flat) == len(set(flat))

    def test_mdg_costs_bounded_retries(self, two_entities):
        a, b = two_entities
        truth = {r.rid: 0 for r in a} | {r.rid: 1 for r in b}
        llm = SimulatedLLM(truth, GPT_4O_MINI, seed=0)
        cluster_with_guardrail(llm, a + b, max_retries=2)
        assert llm.ledger.n_calls <= 3
