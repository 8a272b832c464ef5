"""CEL/CEQL language front-end and Complex Event Automata (CEA).

Submodules:

- ``predicates`` — atomic unary predicates and per-tuple bit-vectors.
- ``cel``        — the CEL abstract syntax tree (Section 3 grammar).
- ``ceql``       — a recursive-descent parser for the CEQL surface syntax.
- ``automaton``  — CEL → (V)CEA compilation (appendix A.1 construction).
- ``determinize``— on-the-fly I/O-determinization with caching (Section 5.4).
- ``brute``      — reference implementation of the Table-2 valuation
                   semantics, used as ground truth in tests.
"""
