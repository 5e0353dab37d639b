"""CrowdER+LLM baseline [77]: clustering HITs with overlap.

CrowdER generates record sets ("HITs") that together *cover every
uncertain pair* in a block, allowing records to repeat across sets;
cluster merging then happens indirectly through the overlapping
records via transitive closure. We keep that design but replace the
crowd with the same LLM clustering call our method uses (per §6.2.2),
same set size, same blocking.

Reproduced consequences (Table 4 + §2): covering all uncertain pairs
with overlapping sets needs 2–5× more sets (API calls) than our
hierarchical NRS/CMR construction, and the absence of any output
verification lets wrong merges propagate through the closure.
"""
from __future__ import annotations

import numpy as np

from ..core.records import Record
from ..embed.similarity import cosine_matrix
from ..llm.simulated import SimulatedLLM
from .pairwise import TransitiveState


def uncertain_pairs(
    block: list[Record], threshold: float = 0.25
) -> list[tuple[int, int]]:
    """Pairs a cheap similarity cannot rule out (must be covered)."""
    n = len(block)
    sims = cosine_matrix(np.stack([r.vec for r in block]))
    return [
        (i, k)
        for i in range(n)
        for k in range(i + 1, n)
        if sims[i, k] >= threshold
    ]


def build_hits(
    block: list[Record],
    pairs: list[tuple[int, int]],
    s_s: int = 9,
) -> list[list[int]]:
    """Greedy set-cover HIT generation (CrowdER's cluster-based HITs).

    Repeatedly seed a HIT with the record incident to the most
    uncovered pairs, grow it along uncovered edges up to ``s_s``
    records, and mark every in-HIT pair covered. Records may appear in
    several HITs — the overlap CrowdER relies on for merging.
    """
    uncovered: set[tuple[int, int]] = set(pairs)
    adj: dict[int, set[int]] = {}
    for i, k in pairs:
        adj.setdefault(i, set()).add(k)
        adj.setdefault(k, set()).add(i)
    hits: list[list[int]] = []
    while uncovered:
        deg: dict[int, int] = {}
        for i, k in uncovered:
            deg[i] = deg.get(i, 0) + 1
            deg[k] = deg.get(k, 0) + 1
        seed = max(deg, key=lambda x: (deg[x], -x))
        hit = [seed]
        members = {seed}
        while len(hit) < s_s:
            # neighbour (via an uncovered pair) of any member, max degree
            cands = {
                nb
                for m in members
                for nb in adj.get(m, ())
                if nb not in members
                and any(
                    (min(m2, nb), max(m2, nb)) in uncovered for m2 in members
                )
            }
            if not cands:
                break
            nxt = max(cands, key=lambda x: (deg.get(x, 0), -x))
            hit.append(nxt)
            members.add(nxt)
        for a_i in range(len(hit)):
            for b_i in range(a_i + 1, len(hit)):
                uncovered.discard(
                    (min(hit[a_i], hit[b_i]), max(hit[a_i], hit[b_i]))
                )
        hits.append(hit)
    return hits


def crowder_er_block(
    block: list[Record],
    llm: SimulatedLLM,
    *,
    s_s: int = 9,
    threshold: float = 0.25,
) -> dict[int, int]:
    """CrowdER-style ER of one block with LLM clustering; rid → label."""
    n = len(block)
    if n <= 1:
        return {r.rid: i for i, r in enumerate(block)}
    pairs = uncertain_pairs(block, threshold)
    state = TransitiveState(n)
    if pairs:
        pos = {r.rid: i for i, r in enumerate(block)}
        for hit in build_hits(block, pairs, s_s):
            clusters = llm.cluster_records([block[i] for i in hit])
            for cluster in clusters:
                ids = [pos[r.rid] for r in cluster if r.rid in pos]
                for a_i in range(1, len(ids)):
                    # no verification: every co-clustering is accepted,
                    # and merging happens only via transitive closure
                    state.record_same(ids[0], ids[a_i])
    return state.assignment(block)
