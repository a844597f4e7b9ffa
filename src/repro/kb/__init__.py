"""External-resource substrate: synthetic knowledge bases and synonym
dictionaries standing in for ConceptNet / DBpedia / WordNet (DESIGN.md §3)."""
