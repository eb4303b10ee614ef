"""Text substrate: deterministic hashed embeddings standing in for the
paper's transformer pre-trained language model (TPLM).

``HashedLM`` plays the role of the frozen pretrained encoder: every
token (and its char-3-grams, mimicking subword robustness) maps to a
fixed pseudo-random vector via blake2b hashing, so embeddings are
identical on the driver and on every Spark executor. The trainable
"fine-tuned" part of the paper's transformer is the backbone matrix in
``repro.core.encoders`` / ``repro.core.matcher``.
"""
from repro.text.tokenize import tokenize  # noqa: F401
from repro.text.features import HashedLM  # noqa: F401
