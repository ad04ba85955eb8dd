"""Modified baselines from §6.4 (none solve table containment exactly)."""
