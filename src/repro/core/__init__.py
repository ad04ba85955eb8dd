"""R2D2 core: the three-stage containment pipeline and its theory."""
