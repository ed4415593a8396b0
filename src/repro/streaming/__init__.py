"""PySpark Structured Streaming integration (see DESIGN.md §6)."""
from .stateful import run_sliding_stream, sliding_stateful_transform

__all__ = ["run_sliding_stream", "sliding_stateful_transform"]
