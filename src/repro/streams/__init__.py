"""Event-stream generators for the Section 6 experiments."""

from .generators import (  # noqa: F401
    random_stream,
    stock_stream,
    to_pandas,
    typed_stream,
)
