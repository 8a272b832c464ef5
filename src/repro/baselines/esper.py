"""Esper-style baseline.

Esper evaluates patterns with a delta-network of per-state buffers: partial
matches are retained *grouped by automaton state* and guards are evaluated
once per (state, transition) instead of once per run — cheaper dispatch than
SASE's per-run loop. But, like Esper's ``MatchedEventMap``, the per-match
event collection is **copied on every extension/branch**, so per-event cost
is Θ(#partial matches · match length) and memory is the total size of all
materialized partial matches — the super-linear explosion of Example 1.
Full operator support (disjunction, iteration), unlike SASE.
"""
from __future__ import annotations

from typing import Any, Dict, List, Mapping, Optional

from .nfa_base import BaselineBase, Match


class EsperEngine(BaselineBase):
    def __init__(self, *args, **kw):
        super().__init__(*args, **kw)
        # state -> list of (start_pos, start_ts, positions-tuple)
        self.buffers: Dict[int, List[tuple]] = {}

    def process(
        self,
        t: Mapping[str, Any],
        ts: Optional[float] = None,
        pos: Optional[int] = None,
        enumerate_outputs: bool = True,
    ) -> List[Match]:
        j = self._next_pos(pos)
        now = float(j) if ts is None else ts
        bv = self.index.bitvector(t)
        tau = -float("inf") if self.window is None else now - self.window

        new_buffers: Dict[int, List[tuple]] = {}
        matches: List[Match] = []
        cap = self.max_runs
        count = [0]

        def deliver(dst, mark, pms):
            if cap is not None:
                room = cap - count[0]
                if room <= 0:
                    return
                if len(pms) > room:
                    pms = pms[:room]
                count[0] += len(pms)
            if mark:
                # MatchedEventMap semantics: copy the collection on extension.
                ext = [(sp, st, ps + (j,)) for (sp, st, ps) in pms]
            else:
                ext = pms
            tgt = new_buffers.get(dst)
            if tgt is None:
                new_buffers[dst] = list(ext)
            else:
                tgt.extend(ext)
            if dst in self.finals:
                for (sp, _, ps) in ext:
                    if self.limit is not None and len(matches) >= self.limit:
                        break
                    matches.append((sp, j, ps))

        # New runs start here.
        for (mark, dst) in self._transitions(self.q0, bv):
            deliver(dst, mark, [(j, now, ())])
        # Extend retained partial matches, one guard evaluation per state.
        for state, pms in self.buffers.items():
            trans = self._transitions(state, bv)
            if not trans:
                continue
            live = [pm for pm in pms if pm[1] >= tau]
            if not live:
                continue
            for (mark, dst) in trans:
                deliver(dst, mark, live)

        self.n_outputs += len(matches)
        if matches and self.consume:
            self.buffers = {}
        else:
            self.buffers = new_buffers
        return matches if enumerate_outputs else matches[:1]

    def reset(self) -> None:
        self.buffers = {}

    @property
    def n_partial_matches(self) -> int:
        return sum(len(v) for v in self.buffers.values())
