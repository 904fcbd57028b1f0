"""eval subpackage of the Loom reproduction."""
