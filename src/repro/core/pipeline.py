"""End-to-end per-block LLM-CER — Algorithm 4.

One block (from :mod:`repro.blocking`) is resolved fully locally:

* **Level 0** — NRS (Alg. 1) partitions the block into record sets;
  each is in-context clustered by the LLM under the MDG guardrail
  (Alg. 2); every output cluster becomes an Item, and clusters born
  from the same record set are marked mutually anti (anti-transitive).
* **Levels 1+** — CMR (Alg. 3) packs items into new record sets, the
  LLM clusters their representative records, merges are applied, and
  un-merged co-packed items gain anti edges. Rounds continue until a
  round merges nothing (the paper's exit condition: a round whose
  outputs are all singletons doubles as the batched "final check"), or
  until no pair of items with an unknown relation remains.

The per-level record-set counts are recorded for Table 3.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from typing import TYPE_CHECKING

from .cmr import Item, apply_merge_result, build_round_sets
from .mdg import cluster_with_guardrail
from .nrs import record_sets_for_block
from .records import Record

if TYPE_CHECKING:  # avoid a core<->llm import cycle at runtime
    from ..llm.simulated import SimulatedLLM

_MAX_ROUNDS = 40


@dataclass
class BlockResult:
    """Outcome of resolving one block."""

    assignment: dict[int, int]  # record_id -> local cluster label
    level_set_counts: list[int] = field(default_factory=list)

    @property
    def n_clusters(self) -> int:
        return len(set(self.assignment.values()))


def resolve_block(
    block: list[Record],
    llm: "SimulatedLLM",
    *,
    s_s: int = 9,
    s_d: int = 4,
    use_mdg: bool = True,
    merge_strategy: str = "similarity",
    batch_size: int = 0,
    seed: int = 0,
) -> BlockResult:
    """Run Algorithm 4 on one block.

    ``batch_size > 0`` switches level-0 and merge rounds to batched
    clustering (several record sets per API call, Appendix A.10).
    ``use_mdg=False`` is the Table 8 ablation. ``merge_strategy`` may
    be ``"random"`` for the Appendix A.8 ablation.
    """
    if not block:
        return BlockResult(assignment={})
    if len(block) == 1:
        return BlockResult(assignment={block[0].rid: 0}, level_set_counts=[0])

    # ---- Level 0: NRS record sets + guarded in-context clustering
    level_counts: list[int] = []
    rsets = record_sets_for_block(block, s_s, s_d, seed=seed)
    level_counts.append(len(rsets))
    items: list[Item] = []
    next_iid = 0
    clusterings = _cluster_sets(llm, rsets, use_mdg, batch_size)
    for set_id, clusters in enumerate(clusterings):
        born = []
        for c in clusters:
            items.append(Item(iid=next_iid, members=list(c), origin=set_id))
            born.append(next_iid)
            next_iid += 1
        for i in range(len(born)):  # same-set clusters are anti (different)
            for k in range(i + 1, len(born)):
                items[born[i]].anti.add(born[k])
                items[born[k]].anti.add(born[i])

    # ---- Levels 1+: hierarchical merging until knowledge is complete
    for rnd in range(_MAX_ROUNDS):
        round_sets = build_round_sets(
            items, s_s, strategy=merge_strategy, seed=seed + rnd + 1
        )
        if not round_sets:
            break
        level_counts.append(len(round_sets))
        rep_sets = [[it.rep for it in s] for s in round_sets]
        rep_clusterings = _cluster_sets(llm, rep_sets, use_mdg, batch_size)
        items, n_merges, next_iid = apply_merge_result(
            items, round_sets, rep_clusterings, next_iid
        )
        if n_merges * 10 < len(round_sets):
            # Exit condition (§5.4): a round whose outputs are (almost)
            # all singleton clusters doubles as the batched final
            # check, so stop rather than exhausting every remaining
            # unknown pair.
            break

    assignment = {
        r.rid: lab for lab, it in enumerate(items) for r in it.members
    }
    return BlockResult(assignment=assignment, level_set_counts=level_counts)


def _cluster_sets(
    llm: "SimulatedLLM",
    rsets: list[list[Record]],
    use_mdg: bool,
    batch_size: int,
) -> list[list[list[Record]]]:
    """Cluster each record set, guarded; optionally batched calls."""
    if batch_size <= 1:
        return [
            cluster_with_guardrail(llm, rset, use_mdg=use_mdg)
            for rset in rsets
        ]
    from .mdg import (
        _repair, misclustered, regenerate_order, structurally_valid,
    )

    n = len(rsets)
    results: list[list[list[Record]] | None] = [None] * n
    best: dict[int, tuple[float, list[list[Record]]]] = {}
    order: dict[int, list[Record]] = {i: rsets[i] for i in range(n)}
    pending = list(range(n))
    # MDG-rejected sets are re-asked in *batches* as well — the whole
    # point of Appendix A.10 is that retries must not fall back to one
    # call per set, or the batching saving evaporates
    for attempt in range(2):
        answers: dict[int, list[list[Record]]] = {}
        for b0 in range(0, len(pending), batch_size):
            chunk_ids = pending[b0 : b0 + batch_size]
            raw = llm.cluster_batch(
                [order[i] for i in chunk_ids], salt=attempt * 10_000 + b0
            )
            answers.update(dict(zip(chunk_ids, raw)))
        still: list[int] = []
        for i, clusters in answers.items():
            if not structurally_valid(rsets[i], clusters):
                if not use_mdg:
                    results[i] = _repair(rsets[i], clusters)
                else:
                    still.append(i)  # fresh draw next attempt
                continue
            if not use_mdg:
                results[i] = clusters
                continue
            bad = misclustered(clusters)
            if len(bad) < best.get(i, (float("inf"), None))[0]:
                best[i] = (len(bad), clusters)
            if not bad:
                results[i] = clusters
            else:
                order[i] = regenerate_order(clusters, bad)
                still.append(i)
        pending = still
        if not pending:
            break
    for i in range(n):
        if results[i] is None:
            results[i] = (
                best[i][1] if i in best else [[r] for r in rsets[i]]
            )
    return results  # type: ignore[return-value]
