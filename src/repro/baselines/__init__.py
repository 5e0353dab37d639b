"""Competing ER methods (§6.2.2, Appendix A.5)."""
from .booster import booster_er_block
from .bq import annotation_cost, bq_er_block
from .crowder import build_hits, crowder_er_block, uncertain_pairs
from .pairwise import TransitiveState, pairwise_er_block
from .plm import DEEPMATCHER, DITTO, plm_cost_usd, plm_er_block

__all__ = [
    "DEEPMATCHER", "DITTO", "TransitiveState", "annotation_cost",
    "booster_er_block", "bq_er_block", "build_hits", "crowder_er_block",
    "pairwise_er_block", "plm_cost_usd", "plm_er_block", "uncertain_pairs",
]
