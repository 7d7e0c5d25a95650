"""Comparator algorithms: the worklist baseline (GLL stand-in) and a naive reference."""
