"""Graph substrate: data model, paper benchmark generators, random graphs."""
from .model import Adj, Edge, GraphBundle, LocalGraph, from_spark  # noqa: F401
