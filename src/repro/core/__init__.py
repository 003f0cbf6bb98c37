"""PushdownDB's contribution: operators decomposed around S3 Select.

``tables`` lands synthetic data in the object store; ``runner`` wraps a
query's phases with usage/cost/runtime accounting; the ``*_ops`` modules
implement the paper's filter, join, group-by, and top-K algorithms; and
``tpch`` assembles them into the Fig 10 query suite.
"""
