"""Dataset substrate.

The paper evaluates on five Magellan/DeepMatcher benchmarks plus a
multilingual EN-DE corpus, none of which ship with this container.
These generators synthesize datasets that mirror each benchmark's
scale ratios, schema style, dirtiness and hard-negative structure
(documented per-dataset in ``er_synth.DATASET_SPECS``), at a
configurable ``scale`` (1.0 = paper-sized).
"""
from repro.data.er_synth import DATASET_SPECS, ERDataset, make_dataset  # noqa: F401
from repro.data.multilingual import make_multilingual  # noqa: F401
