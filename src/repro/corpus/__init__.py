"""Synthetic e-commerce raw-data substrate.

Substitutes the proprietary Alibaba corpus (DESIGN.md, substitution
table): deterministic product records with noisy brand/place surface
strings, titles composed of brand/category/attribute/concept/noise
tokens, and aspect-opinion reviews.  Ground-truth columns are retained
so construction pipelines can be scored against known answers.
"""
from repro.corpus.products import RawCatalog, generate_catalog
from repro.corpus.reviews import generate_reviews
from repro.corpus.vocab import SurfaceForms, build_surface_forms

__all__ = [
    "RawCatalog",
    "generate_catalog",
    "generate_reviews",
    "SurfaceForms",
    "build_surface_forms",
]
