"""The paper's contribution: CFPQ by matrix transitive closure, in four engines."""
