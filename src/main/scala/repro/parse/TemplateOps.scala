package repro.parse

/** Helpers over mined templates. */
object TemplateOps {

  /** Extract the variable values of a message against a template: the
    * message tokens standing at the template's `<*>` positions. Length
    * mismatches yield the positions that exist on both sides.
    */
  def extractVars(template: Seq[String], tokens: Seq[String]): Seq[String] =
    template.indices.collect {
      case i if template(i) == "<*>" && i < tokens.length => tokens(i)
    }

  /** Render a template token vector as its canonical string. */
  def render(template: Seq[String]): String = template.mkString(" ")
}
