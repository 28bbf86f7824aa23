"""Per-table reproduction harnesses (Tables I–VII).

Each module exposes ``run(ctx) -> pandas.DataFrame`` whose rows pair
the paper's published numbers with our measured ones, plus
``to_markdown`` helpers used by ``jobs/make_experiments_md.py``.
"""
