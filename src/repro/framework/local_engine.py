"""Pure-Python reference engine for the block runtime.

Runs the exact same per-block semantics as the Spark engine (both call
:func:`repro.framework.block_runtime.run_block_round`), with message
routing done in process. Used as the fast oracle in unit tests and to
cross-validate the distributed engine.
"""
from __future__ import annotations

from collections import defaultdict
from typing import Any

from repro.framework.block_runtime import (
    Message,
    RunStats,
    VertexCtx,
    VertexProgram,
    VRec,
    init_block,
    run_block_round,
)

Edge = tuple[int, int]


def adjacency(edges: list[Edge]) -> tuple[dict[int, tuple], dict[int, tuple]]:
    """(in_nbrs, out_nbrs) maps covering every endpoint, duplicate edges
    removed (the paper assumes a simple digraph)."""
    seen: set[Edge] = set()
    in_n: dict[int, list[int]] = defaultdict(list)
    out_n: dict[int, list[int]] = defaultdict(list)
    verts: set[int] = set()
    for u, v in edges:
        verts.add(u)
        verts.add(v)
        if u == v or (u, v) in seen:
            continue
        seen.add((u, v))
        out_n[u].append(v)
        in_n[v].append(u)
    return (
        {v: tuple(in_n.get(v, ())) for v in verts},
        {v: tuple(out_n.get(v, ())) for v in verts},
    )


class LocalEngine:
    """Reference engine over an in-memory edge list.

    ``partition`` maps vid -> block id; defaults to a single block.
    """

    def __init__(self, edges: list[Edge], partition: dict[int, int] | None = None):
        self.in_nbrs, self.out_nbrs = adjacency(edges)
        self.vertices = sorted(self.in_nbrs)
        self.partition = partition or {v: 0 for v in self.vertices}
        missing = [v for v in self.vertices if v not in self.partition]
        if missing:
            raise ValueError(f"partition misses vertices, e.g. {missing[:3]}")

    def run(
        self,
        program: VertexProgram,
        mode: str = "vertex",
        attrs: dict[int, dict[str, Any]] | None = None,
        max_rounds: int = 100_000,
    ) -> tuple[dict[int, Any], RunStats]:
        if mode not in ("vertex", "block"):
            raise ValueError(f"unknown mode {mode!r}")
        blocks: dict[int, dict[int, VRec]] = defaultdict(dict)
        for v in self.vertices:
            ctx = VertexCtx(
                vid=v,
                in_nbrs=self.in_nbrs[v],
                out_nbrs=self.out_nbrs[v],
                attrs=(attrs or {}).get(v, {}),
            )
            cons = tuple((c, self.partition[c]) for c in program.consumers(ctx))
            blocks[self.partition[v]][v] = VRec(ctx=ctx, block=self.partition[v], consumers=cons)

        def volume(msgs: list[Message]) -> int:
            return sum(program.payload_size(m[3]) for m in msgs)

        stats = RunStats()
        pending: list[Message] = []
        for bid, recs in blocks.items():
            pending += init_block(bid, recs, program, mode)
        stats.msgs_per_round.append(len(pending))
        stats.changed_per_round.append(0)
        stats.volume_per_round.append(volume(pending))

        for r in range(1, max_rounds + 1):
            inbox: dict[int, list[tuple[int, int, Any]]] = defaultdict(list)
            for dblock, dvid, svid, payload in pending:
                inbox[dblock].append((dvid, svid, payload))
            n_changed, pending = 0, []
            for bid, recs in blocks.items():
                if r > 1 and not inbox.get(bid) and not any(
                    rec.self_active for rec in recs.values()
                ):
                    continue
                changed, out = run_block_round(
                    bid, recs, inbox.get(bid, []), program, mode, r
                )
                n_changed += len(changed)
                pending += out
            stats.msgs_per_round.append(len(pending))
            stats.changed_per_round.append(n_changed)
            stats.volume_per_round.append(volume(pending))
            if not pending and n_changed == 0:
                break
        else:
            raise RuntimeError(f"no convergence within {max_rounds} rounds")

        values: dict[int, Any] = {}
        for recs in blocks.values():
            for v, rec in recs.items():
                values[v] = rec.value
                stats.converge_round[v] = rec.changed_round
        return values, stats
