"""Query optimizer tailored for Yannakakis+ (paper §5): rule-based rewrites,
statistics, cardinality estimation under three scenarios, a cost model over
the operator IR, and join-tree plan enumeration."""

from .enumerate import choose_plan  # noqa: F401
