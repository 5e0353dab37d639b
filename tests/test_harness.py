"""Tests for the experiment harness over small datasets."""
import pytest

from repro.experiments.harness import METHODS, RunResult, prepare, run_er


@pytest.fixture(scope="module")
def prepared_cora(cora_small):
    sp, _, recs, truth = cora_small
    return sp, (recs, truth)


class TestRunEr:
    @pytest.mark.parametrize(
        "method", ["llm_cer", "pairwise", "bq", "booster", "crowder"]
    )
    def test_llm_methods(self, method, prepared_cora):
        sp, prepared = prepared_cora
        r = run_er(sp, method, seed=0, prepared=prepared)
        assert isinstance(r, RunResult)
        assert 0.0 <= r.acc <= 1.0 and 0.0 <= r.fp <= 1.0
        assert r.n_calls > 0
        assert r.cost_usd >= 0 and r.tokens_m > 0
        assert set(r.assignment) == set(r.truth)

    @pytest.mark.parametrize("method", ["ditto", "deepmatcher"])
    def test_plm_methods_no_llm_calls(self, method, prepared_cora):
        sp, prepared = prepared_cora
        r = run_er(sp, method, ft_frac=0.2, seed=0, prepared=prepared)
        assert r.n_calls == 0
        # GPU fine-tuning dominates even at 10% dataset scale
        assert r.cost_usd > 0.1

    def test_unknown_method(self, prepared_cora):
        sp, prepared = prepared_cora
        with pytest.raises(ValueError):
            run_er(sp, "nope", prepared=prepared)

    def test_string_dataset_name(self):
        r = run_er("cora", "llm_cer", scale=0.05, seed=0)
        assert r.dataset == "cora"

    def test_level_counts_only_for_llm_cer(self, prepared_cora):
        sp, prepared = prepared_cora
        cer = run_er(sp, "llm_cer", seed=0, prepared=prepared)
        pw = run_er(sp, "pairwise", seed=0, prepared=prepared)
        assert cer.level_counts and not pw.level_counts

    def test_clustering_cheaper_than_pairwise(self, prepared_cora):
        """The Table 2 headline shape at test scale."""
        sp, prepared = prepared_cora
        cer = run_er(sp, "llm_cer", seed=0, prepared=prepared)
        pw = run_er(sp, "pairwise", seed=0, prepared=prepared)
        assert cer.n_calls < pw.n_calls
        assert cer.tokens_m < pw.tokens_m
        assert cer.time_min < pw.time_min

    def test_bq_most_token_hungry(self, prepared_cora):
        sp, prepared = prepared_cora
        cer = run_er(sp, "llm_cer", seed=0, prepared=prepared)
        bq = run_er(sp, "bq", seed=0, prepared=prepared)
        assert bq.tokens_m > cer.tokens_m
        assert bq.cost_usd > cer.cost_usd

    def test_mdg_ablation_changes_calls(self, prepared_cora):
        sp, prepared = prepared_cora
        with_mdg = run_er(sp, "llm_cer", use_mdg=True, seed=0, prepared=prepared)
        without = run_er(sp, "llm_cer", use_mdg=False, seed=0, prepared=prepared)
        assert with_mdg.n_calls >= without.n_calls

    def test_pair_confusion_totals(self, prepared_cora):
        sp, prepared = prepared_cora
        r = run_er(sp, "llm_cer", seed=0, prepared=prepared)
        pc = r.pair_confusion()
        n = len(r.truth)
        assert sum(pc.values()) == n * (n - 1) // 2

    def test_prepare_scales(self):
        from repro.datasets.registry import SPECS

        pdf, recs, truth = prepare(SPECS["as"], scale=0.05)
        assert len(recs) == len(pdf)
        assert len(recs) < SPECS["as"].n_records
