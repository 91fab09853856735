"""The paper's core: streaming graph model, SGA, SGQParser, rewrites,
and the DuckDB snapshot-reducibility oracle."""
