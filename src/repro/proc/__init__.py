"""Query processing: the list-based processor (LBP, paper §6), the
Volcano tuple-at-a-time baselines, the plan compiler, and the
Spark-distributed runner."""

from repro.proc.plan import Predicate, QueryEdge, QuerySpec  # noqa: F401
