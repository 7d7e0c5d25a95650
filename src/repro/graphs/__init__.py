"""Graph substrate: edge-list model and the synthetic ontology dataset."""
