"""§5: OPT-RET cost optimization, Dyn-Lin, and supporting substrates."""
