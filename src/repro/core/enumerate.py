"""Output-linear-delay enumeration over a tECS (paper Algorithm 2).

Iterative DFS with an explicit stack of ``(node, positions)`` pairs, where
``positions`` is a cons cell ``(pos, parent)`` — pushing a branch point is
O(1), as the appendix's proof requires. A union node's right child is pushed
only when its ``max_start`` is inside the time window, so no time is ever
spent below subtrees that cannot produce output; combined with 3-boundedness
and time-ordering this gives delay linear in the size of each produced
complex event (Theorem 2).
"""
from __future__ import annotations

from typing import List, Optional, Tuple

from .tecs import Bottom, Node, Output, Union

# A recognized complex event: (start position, end position, marked positions)
Match = Tuple[int, int, Tuple[int, ...]]


def enumerate_matches(
    root: Node,
    end_pos: int,
    now: float,
    window: Optional[float],
    limit: Optional[int] = None,
    out: Optional[List[Match]] = None,
) -> List[Match]:
    """Enumerate ``[[root]]^window(now)``, closing every open complex event
    with ``end_pos``. Appends to ``out`` (created if None) and stops early
    once ``limit`` total entries are present (the paper's experiments cap
    enumeration at the first 10 results per input event)."""
    if out is None:
        out = []
    tau = -float("inf") if window is None else now - window
    if root.max_start < tau:
        return out
    stack = [(root, None)]
    while stack:
        node, positions = stack.pop()
        while True:
            kind = type(node)
            if kind is Bottom:
                # The cons chain heads at the deepest (earliest) marked
                # position, so walking it yields ascending positions.
                data: List[int] = []
                p = positions
                while p is not None:
                    data.append(p[0])
                    p = p[1]
                out.append((node.pos, end_pos, tuple(data)))
                if limit is not None and len(out) >= limit:
                    return out
                break
            if kind is Output:
                positions = (node.pos, positions)
                node = node.child
            else:  # Union
                right = node.right
                if right.max_start >= tau:
                    stack.append((right, positions))
                node = node.left
    return out
