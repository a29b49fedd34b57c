"""Comparison algorithms: Exact, Rand / Sup / Tur, and vertex-anchoring AKT."""
