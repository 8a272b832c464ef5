"""CORE's evaluation core: tECS data structure, output-linear-delay
enumeration (Algorithm 2), the incremental evaluation engine (Algorithm 1),
and PARTITION BY routing."""

from .engine import CoreEngine  # noqa: F401
from .partition import PartitionedEngine  # noqa: F401
