"""Edge-weight generation.

``distributions`` assigns the four Table III weight distributions (AE, UF,
SK, and rating-style) to pandas edge lists deterministically in a seed;
``rwr`` computes random-walk-with-restart relevance weights (the paper's RW
distribution, ref [23]) as a Spark power iteration.
"""
