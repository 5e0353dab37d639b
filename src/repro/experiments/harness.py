"""Experiment harness: one (dataset, method) end-to-end ER run.

Every results table in the paper is some selection of the columns this
harness produces: quality (ACC / FP / NMI / ARI), #API calls, tokens,
monetary cost and simulated time, plus the per-level record-set counts
for Table 3.

The harness runs blocking once and then dispatches each block to the
requested method, so method comparisons share identical blocks (the
paper's "same blocking approach" fairness condition).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd

from ..baselines.booster import booster_er_block
from ..baselines.bq import annotation_cost, bq_er_block
from ..baselines.crowder import crowder_er_block
from ..baselines.pairwise import pairwise_er_block
from ..baselines.plm import DEEPMATCHER, DITTO, plm_cost_usd, plm_er_block
from ..blocking import BLOCKERS
from ..core.metrics import all_metrics, pair_confusion
from ..core.pipeline import resolve_block
from ..core.records import Record, build_records
from ..datasets.generator import generate
from ..datasets.registry import SPECS
from ..datasets.schema import DatasetSpec
from ..llm.profiles import GPT_4O_MINI, LLMProfile
from ..llm.simulated import SimulatedLLM

METHODS = (
    "llm_cer", "pairwise", "bq", "booster", "crowder", "ditto", "deepmatcher"
)


@dataclass
class RunResult:
    """All reported columns for one end-to-end run."""

    dataset: str
    method: str
    acc: float
    fp: float
    nmi: float
    ari: float
    n_calls: int
    tokens_m: float
    cost_usd: float
    time_min: float
    level_counts: list[int] = field(default_factory=list)
    assignment: dict[int, int] = field(default_factory=dict, repr=False)
    truth: dict[int, int] = field(default_factory=dict, repr=False)

    def pair_confusion(self) -> dict[str, int]:
        return pair_confusion(self.assignment, self.truth)


def prepare(
    spec: DatasetSpec, scale: float = 1.0
) -> tuple[pd.DataFrame, list[Record], dict[int, int]]:
    """Generate the dataset (optionally scaled) and build records."""
    if scale != 1.0:
        spec = spec.scaled(scale)
    pdf = generate(spec)
    recs, truth = build_records(pdf, spec)
    return pdf, recs, truth


def run_er(
    spec: DatasetSpec | str,
    method: str = "llm_cer",
    *,
    scale: float = 1.0,
    profile: LLMProfile = GPT_4O_MINI,
    blocking: str = "lsh",
    s_s: int = 9,
    s_d: int = 4,
    use_mdg: bool = True,
    merge_strategy: str = "similarity",
    batch_size: int = 0,
    few_shot: int = 0,
    few_shot_hard: bool = False,
    ft_frac: float = 0.0,
    seed: int = 0,
    prepared: tuple[list[Record], dict[int, int]] | None = None,
) -> RunResult:
    """Run one end-to-end experiment; see METHODS for method names.

    ``prepared`` lets callers reuse (records, truth) across methods so
    a table's rows share the exact same input.
    """
    if isinstance(spec, str):
        spec = SPECS[spec]
    if method not in METHODS:
        raise ValueError(f"unknown method {method!r}; one of {METHODS}")
    if prepared is None:
        _, recs, truth = prepare(spec, scale)
    else:
        recs, truth = prepared

    blocks = BLOCKERS[blocking](recs)
    llm = SimulatedLLM(
        truth,
        profile,
        seed=seed,
        few_shot=few_shot,
        few_shot_hard=few_shot_hard,
    )

    assignment: dict[int, int] = {}
    next_label = 0
    level_counts: list[int] = []
    for bi, block in enumerate(blocks):
        if method == "llm_cer":
            res = resolve_block(
                block,
                llm,
                s_s=s_s,
                s_d=s_d,
                use_mdg=use_mdg,
                merge_strategy=merge_strategy,
                batch_size=batch_size,
                seed=seed + bi,
            )
            local = res.assignment
            for i, cnt in enumerate(res.level_set_counts):
                if i >= len(level_counts):
                    level_counts.append(0)
                level_counts[i] += cnt
        elif method == "pairwise":
            local = pairwise_er_block(block, llm, use_guardrail=use_mdg)
        elif method == "bq":
            local = bq_er_block(block, llm)
        elif method == "booster":
            local = booster_er_block(block, llm, seed=seed + bi)
        elif method == "crowder":
            local = crowder_er_block(block, llm, s_s=s_s)
        else:  # ditto / deepmatcher
            model = DITTO if method == "ditto" else DEEPMATCHER
            local = plm_er_block(block, model, ft_frac, seed=seed + bi)
        remap: dict[int, int] = {}
        for rid, lab in local.items():
            if lab not in remap:
                remap[lab] = next_label
                next_label += 1
            assignment[rid] = remap[lab]

    quality = all_metrics(assignment, truth)
    snap = llm.ledger.snapshot()
    cost = snap["cost_usd"]
    if method == "bq":
        cost += annotation_cost()
    if method in ("ditto", "deepmatcher"):
        cost = plm_cost_usd(len(recs), ft_frac)
    return RunResult(
        dataset=spec.name,
        method=method,
        acc=quality["acc"],
        fp=quality["fp"],
        nmi=quality["nmi"],
        ari=quality["ari"],
        n_calls=int(snap["n_calls"]),
        tokens_m=snap["tokens"] / 1e6,
        cost_usd=cost,
        time_min=snap["sim_time_s"] / 60.0,
        level_counts=level_counts,
        assignment=assignment,
        truth=truth,
    )
