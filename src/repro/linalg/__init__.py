"""Minimal numerical substrate: reverse-mode autograd, AdamW, losses.

Stands in for PyTorch at the scale DIAL's models need (<100k params,
labeled sets of a few hundred pairs). Everything whose cost grows with
|R|x|S| lives in Spark, not here.
"""
from repro.linalg.autograd import Tensor, param, const  # noqa: F401
from repro.linalg.optim import AdamW  # noqa: F401
