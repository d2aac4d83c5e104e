"""Core RLC-index machinery: label algebra, graph substrate, closure, index."""
