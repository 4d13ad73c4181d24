"""Splitting method (§5.2) and standard templates (§8.1): align joins of
arbitrary shape into equi-length two-attribute chains so the §5.1 overlap
bound applies."""
