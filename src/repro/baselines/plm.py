"""Simulated PLM matchers: Ditto [45] and DeepMatcher [52] (Appendix A.5).

Both are pairwise classifiers. We model each as a noisy logistic
scorer over pair similarity whose calibration improves with the
fine-tuning fraction: without fine-tuning the decision threshold is
miscalibrated and noisy (poor zero-shot transfer of PLMs), 20% FT
partially fixes it, 80% FT approaches the LLM pipeline's quality —
the exact quality ladder of Table 16. Ditto (RoBERTa-class) is
slightly better-calibrated than DeepMatcher (non-transformer) at every
fine-tuning level.

Cost model (per the paper, following [80]): fine-tuning and inference
are billed as cloud NVIDIA A40 GPU-hours. Constants are chosen so the
paper's own accounting (e.g. Alaska 20% FT ≈ $66, 80% ≈ $260) is
reproduced from the record counts alone.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from ..core.records import Record
from ..embed.similarity import cosine
from .pairwise import TransitiveState

A40_USD_PER_HOUR = 0.79
_TRAIN_HOURS_PER_RECORD = 0.035
_INFER_USD_PER_RECORD = 1.0e-5


@dataclass(frozen=True)
class PLMModel:
    name: str
    # decision threshold offset and noise sigma at (0%, 20%, 80%) FT
    offsets: tuple[float, float, float]
    sigmas: tuple[float, float, float]


DITTO = PLMModel("ditto", offsets=(0.22, 0.12, 0.06), sigmas=(0.20, 0.12, 0.05))
DEEPMATCHER = PLMModel(
    "deepmatcher", offsets=(0.28, 0.16, 0.09), sigmas=(0.26, 0.17, 0.08)
)


def _level(ft_frac: float) -> int:
    if ft_frac >= 0.8:
        return 2
    if ft_frac >= 0.2:
        return 1
    return 0


def plm_match_prob(
    a: Record, b: Record, model: PLMModel, ft_frac: float
) -> float:
    """Deterministic part of the classifier score for a pair."""
    lvl = _level(ft_frac)
    sim = cosine(a.vec, b.vec)
    margin = sim - (0.40 + model.offsets[lvl])
    return float(1.0 / (1.0 + np.exp(-margin / 0.10)))


def plm_er_block(
    block: list[Record],
    model: PLMModel,
    ft_frac: float,
    seed: int = 0,
) -> dict[int, int]:
    """Classify every in-block pair, close transitively; rid → label."""
    n = len(block)
    if n <= 1:
        return {r.rid: i for i, r in enumerate(block)}
    lvl = _level(ft_frac)
    state = TransitiveState(n)
    g = np.random.default_rng(seed * 31 + 7)
    for i in range(n):
        for k in range(i + 1, n):
            p = plm_match_prob(block[i], block[k], model, ft_frac)
            noisy = p + g.normal(0, model.sigmas[lvl])
            if noisy > 0.5 and state.inferred(i, k) is None:
                state.record_same(i, k)
    return state.assignment(block)


def plm_cost_usd(n_records: int, ft_frac: float) -> float:
    """A40 rental cost: fine-tuning hours + inference (paper A.5)."""
    train = n_records * ft_frac * _TRAIN_HOURS_PER_RECORD * A40_USD_PER_HOUR
    infer = n_records * _INFER_USD_PER_RECORD
    return train + infer
