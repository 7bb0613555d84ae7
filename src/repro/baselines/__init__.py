"""Baseline systems: SCR, MCR, and the JOSIE-based adaptations."""
