"""One module per evaluation figure of the paper (Figs 1-11).

Each module exposes ``run(spark, store, sf=...) -> list[dict]`` -- the
figure's table of numbers, with runtime/cost both at measured scale and
projected to the paper's 10 GB -- plus ``PAPER`` rows recording the
numbers the paper reports (read off its figures) for side-by-side
comparison, and a ``headline(rows)`` check of the figure's qualitative
claim. ``jobs/`` and ``benchmarks/`` are thin wrappers around these.
"""
