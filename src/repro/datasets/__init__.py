"""Synthetic stand-ins for the paper's corpora (see DESIGN.md §3).

Each module exposes ``generate(spark, *, scale=1.0, seed=...)`` returning a
scenario dataclass with the corpora, ground truth, and the external
resources (KB, synonym dictionary) the pipeline variants consume. All
generators are deterministic in ``seed`` and size-linear in ``scale``.
"""
