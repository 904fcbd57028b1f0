"""core subpackage of the Loom reproduction."""
