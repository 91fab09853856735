"""Dataflow substrate: micro-batch engine (Timely substitute) with
direct-approach physical operators (§6) and the negative-tuple DD
baseline (§7.2.2)."""
