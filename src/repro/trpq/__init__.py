"""Temporal regular path queries (NavL[PC,NOI]): the paper's contribution."""
