"""Token blocking (substitute for the paper's LSH blocking — see DESIGN.md)."""
from repro.blocking.token_blocking import cross_block, self_block, token_table  # noqa: F401
