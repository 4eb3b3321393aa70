"""Discovery layer: concepts via K-means on factors, relations via top core entries."""
from repro.discovery.concepts import ConceptReport, discover_concepts
from repro.discovery.kmeans import cluster_purity, kmeans
from repro.discovery.relations import Relation, relation_hit_rate, top_relations

__all__ = [
    "ConceptReport",
    "Relation",
    "cluster_purity",
    "discover_concepts",
    "kmeans",
    "relation_hit_rate",
    "top_relations",
]
