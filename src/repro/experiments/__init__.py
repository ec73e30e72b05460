"""Experimental methodology of §4–§5: trial fan-out, distributions, tables."""
