"""Streaming graph generators (dataset substitutions — see DESIGN.md §3)."""
from repro.streams.ldbc_stream import LDBC_LABELS, ldbc_stream
from repro.streams.so_stream import SO_LABELS, so_stream
from repro.streams.uniform import random_stream

__all__ = ["LDBC_LABELS", "SO_LABELS", "ldbc_stream", "so_stream", "random_stream"]
