"""DIAL — the paper's contribution.

Matcher (paired mode, Eq 5/6), Blocker committee (IBC, Eq 7/8),
indexed retrieval, example selectors, and the Algorithm-1 active
learning loop, plus the paper's baselines.
"""
