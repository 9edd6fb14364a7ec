"""Evaluation layer: the paper's §VI-A metrics computed with Spark, plus the
table harnesses that regenerate Tables II-V of the evaluation section.

(Named ``evalx`` to avoid shadowing the ``eval`` builtin in imports.)
"""
