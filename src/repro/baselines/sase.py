"""SASE-style baseline (Wu, Diao, Rizvi — SIGMOD'06).

SASE's runtime keeps an NFA with a *match buffer*: every partial match owns
its sequence of selected events. We model that faithfully: a run is a tuple
``(state, start_pos, start_ts, positions)`` where ``positions`` is a fully
materialized Python tuple — extension copies it (``positions + (j,)``), so
per-event cost is Θ(#runs · match-length) and memory is the total size of
all materialized partial matches.

As in the paper, this baseline does **not** support disjunction (SASE's
language has no OR), which ``supports()`` reports so the harness can skip
D3/D5 and Q4–Q7 exactly like Section 6 does.
"""
from __future__ import annotations

from typing import Any, List, Mapping, Optional

from ..cea import cel
from .nfa_base import BaselineBase, Match


def supports(phi: cel.CEL) -> bool:
    """SASE cannot express disjunction."""
    return not any(isinstance(n, cel.Or) for n in phi.walk())


class SaseEngine(BaselineBase):
    def __init__(self, *args, **kw):
        super().__init__(*args, **kw)
        # runs: (state, start_pos, start_ts, positions-tuple)
        self.runs: List[tuple] = []

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

        new_runs: List[tuple] = []
        matches: List[Match] = []

        cap = self.max_runs

        def fire(state, start_pos, start_ts, positions):
            if cap is not None and len(new_runs) >= cap:
                return
            for (mark, dst) in self._transitions(state, bv):
                np = positions + (j,) if mark else positions
                new_runs.append((dst, start_pos, start_ts, np))
                if dst in self.finals and (
                    self.limit is None or len(matches) < self.limit
                ):
                    matches.append((start_pos, j, np))

        # A new run may start at every position.
        fire(self.q0, j, now, ())
        for (state, start_pos, start_ts, positions) in self.runs:
            if start_ts < tau:
                continue  # window pruning
            fire(state, start_pos, start_ts, positions)

        if matches and not enumerate_outputs:
            matches = matches[:1]
        self.n_outputs += len(matches)
        if matches and self.consume:
            self.runs = []
        else:
            self.runs = new_runs
        return matches if enumerate_outputs else matches[:1]

    def reset(self) -> None:
        self.runs = []

    @property
    def n_partial_matches(self) -> int:
        return len(self.runs)
