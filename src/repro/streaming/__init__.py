"""Structured Streaming embodiment of SGA's non-recursive fragment."""
