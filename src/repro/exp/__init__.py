"""Experiment harnesses: one function per paper table (Tables 1-10),
plus a shared Runner that caches datasets, embedding stores and AL runs
so the ~100 configurations the tables sweep each execute once."""
