"""Column-type detection substrate (paper Section 3).

Four families of "domain-evaluation functions", all standardized to distance
functions f_t^d(v) (Definition 1):

- CTA classifiers (simulated Sherlock/Doduo)      -> cta.py
- Text embeddings (simulated GloVe/SentenceBERT)  -> embedding.py
- Regex-like patterns (corpus-induced)            -> pattern.py
- Validation functions (real implementations)     -> function.py
- Adversarial random-hash functions (§6.5)        -> hashing.py

``registry.py`` assembles them into a single evaluator usable inside Spark
``mapInPandas`` batches.
"""

from repro.typedetect.base import EvalFunctionSpec, KIND_GRIDS, KindGrid, normalize_value

__all__ = ["EvalFunctionSpec", "KIND_GRIDS", "KindGrid", "normalize_value"]
