"""Core CLX implementation: tokenization, pattern clustering, the UniFi
DSL, token alignment, program synthesis, explanation, and the Spark
pipeline gluing them together.

Public entry points:

- :func:`repro.core.tokens.tokenize` — string -> token sequence (§4.1)
- :class:`repro.core.cluster.PatternHierarchy` — Algorithm 1 (§4.2)
- :func:`repro.core.synthesis.synthesize` — Algorithm 2 (§6)
- :func:`repro.core.explain.explain_program` — UniFi -> Replace ops (§5)
- :mod:`repro.core.pipeline` — Spark DataFrame integration
"""
