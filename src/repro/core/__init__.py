"""Peregrine core: patterns, plans, matcher, mining apps."""
