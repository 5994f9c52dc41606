"""Baselines the paper compares against (FlashFill-style synthesis)."""
