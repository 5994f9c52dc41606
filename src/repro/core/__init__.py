"""Core algorithms of the entity-consolidation paper.

Pure-Python algorithmic pieces (structures, LCS alignment, the
FlashFill-style language, transformation graphs, pivot-path search) live
in their own modules and are exercised inside Spark executors by the
Spark-facing modules (rules, grouping, apply_rules, truth_discovery,
pipeline).
"""
