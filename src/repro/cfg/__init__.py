"""Context-free grammar substrate: representation, CNF, paper queries."""
