"""graphs subpackage of the Loom reproduction."""
