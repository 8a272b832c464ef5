"""Baseline CER engines reproducing the *architecture* of the paper's
comparators (SASE, Esper, FlinkCEP) over the same compiled CEA.

All of them maintain the set of partial matches **explicitly** — the
super-linear behaviour that Section 6 measures — and differ in how partial
matches are represented (see each module's docstring). Because they run the
same automaton with the same nondeterministic-run semantics, their match
*sets* are identical to CORE's, which the tests exploit for cross-checking.
"""

from .sase import SaseEngine  # noqa: F401
from .esper import EsperEngine  # noqa: F401
from .flinkcep import FlinkCepEngine  # noqa: F401
