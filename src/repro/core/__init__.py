"""Core contribution of the paper: coverage model and MUP identification.

Modules:

* :mod:`repro.core.patterns` — the pattern abstraction (§II).
* :mod:`repro.core.coverage` — Appendix-A coverage oracle over a Spark
  groupBy aggregate.
* :mod:`repro.core.cube` — Spark-native all-pattern coverage (cube) and
  the distributed naïve MUP algorithm.
* :mod:`repro.core.naive` — driver-side naïve MUP identification (§III-A).
* :mod:`repro.core.pattern_breaker` — Algorithm 1 (§III-C).
* :mod:`repro.core.pattern_combiner` — Algorithm 2 (§III-D).
* :mod:`repro.core.deepdiver` — Algorithm 3 (§III-E).
* :mod:`repro.core.mup_index` — Appendix-B dominance indices.
* :mod:`repro.core.brute` — brute-force reference implementations.
"""
from repro.core.patterns import X, Pattern  # noqa: F401
