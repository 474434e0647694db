"""Spade core: attribute analysis, enumeration, MVDCube, PGCube, early-stop."""
